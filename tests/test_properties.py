"""Property-based invariants of the cost model (hypothesis)."""
import random

import pytest
from hypothesis import given, settings, strategies as st

from repro.core import costmodel as cm
from repro.core import jointree as jt
from repro.core import optimizer as opt
from repro.core.jointree import EdgeStats


@st.composite
def trees(draw, max_nodes=8):
    seed = draw(st.integers(0, 10**6))
    rng = random.Random(seed)
    return jt.random_tree(
        rng,
        max_nodes=draw(st.integers(2, max_nodes)),
        m_range=(draw(st.floats(0.01, 0.3)), draw(st.floats(0.4, 1.0))),
        fo_range=(1.0, draw(st.floats(1.0, 10.0))),
    )


N = 500.0


class TestComVsStd:
    @given(trees())
    @settings(max_examples=40, deadline=None)
    def test_com_probes_never_exceed_std_per_operator(self, t):
        # P(tuple survives branch) <= E[#branch matches] (Markov), so
        # every Eq.1 probe count is bounded by the classical one.
        order = t.default_order()
        com = cm.com_costs(t, order, N, flat_output=False).hash_probes
        std = cm.std_costs(t, order, N).hash_probes
        for op in order:
            assert com[op] <= std[op] * (1 + 1e-9) + 1e-9

    @given(trees())
    @settings(max_examples=25, deadline=None)
    def test_branch_factor_in_unit_interval(self, t):
        processed = set(t.nonroot)
        for c in t.children(t.root):
            bf = cm.branch_factor(t, c, processed)
            assert 0.0 <= bf <= 1.0 + 1e-12

    @given(trees())
    @settings(max_examples=25, deadline=None)
    def test_survival_decreases_along_any_order(self, t):
        prev, seen = 1.0, set()
        for l in t.default_order():
            seen.add(l)
            cur = cm.survival_probability(t, seen)
            assert cur <= prev + 1e-12
            prev = cur


class TestSjInvariants:
    @given(trees())
    @settings(max_examples=30, deadline=None)
    def test_adjusted_m_bounded_by_m_and_fo_at_least_one(self, t):
        _, adj = cm.sj_adjusted(t)
        for c in t.nonroot:
            assert adj[c].m <= t.stats[c].m + 1e-12
            if adj[c].m > 0:
                assert adj[c].fo >= 1.0 - 1e-9

    @given(trees())
    @settings(max_examples=30, deadline=None)
    def test_adjusted_selectivity_is_ratio_times_selectivity(self, t):
        ratio, adj = cm.sj_adjusted(t)
        for c in t.nonroot:
            lhs = adj[c].m * adj[c].fo
            rhs = ratio[c] * t.stats[c].s
            assert lhs == pytest.approx(rhs, rel=1e-9, abs=1e-12)

    @given(trees())
    @settings(max_examples=20, deadline=None)
    def test_sj_output_identity(self, t):
        ratio, adj = cm.sj_adjusted(t)
        out_sj = N * ratio[t.root]
        for c in t.nonroot:
            out_sj *= adj[c].fo
        assert out_sj == pytest.approx(cm.expected_output(t, N), rel=1e-6, abs=1e-9)


class TestOptimizerInvariants:
    @given(trees(max_nodes=7))
    @settings(max_examples=20, deadline=None)
    def test_dp_not_worse_than_random_orders(self, t):
        fn = opt.com_probes_fn(t, N)
        best, _ = opt.exhaustive_optimal(t, fn)
        rng = random.Random(0)
        for _ in range(5):
            order = []
            processed = set()
            while len(order) < len(t.nonroot):
                order.append(rng.choice(sorted(t.eligible(processed))))
                processed.add(order[-1])
            assert opt.order_cost(t, order, fn) >= best - 1e-9

    @given(trees(max_nodes=10))
    @settings(max_examples=20, deadline=None)
    def test_cached_probes_fn_equals_plain(self, t):
        f1, f2 = opt.com_probes_fn(t, N), opt.cached_com_probes_fn(t, N)
        S = frozenset()
        for l in t.default_order():
            assert f1(l, S) == pytest.approx(f2(l, S), rel=1e-12, abs=1e-12)
            S = S | {l}

    @given(trees(max_nodes=8), st.sampled_from(opt.HEURISTICS))
    @settings(max_examples=25, deadline=None)
    def test_greedy_orders_always_valid(self, t, h):
        assert t.is_valid_order(opt.greedy_order(t, h, N))


class TestBvpInvariants:
    @given(trees(), st.floats(0.0, 0.2))
    @settings(max_examples=25, deadline=None)
    def test_eps_monotone_hash_probes(self, t, eps):
        # More false positives → never fewer hash probes.
        order = t.default_order()
        a = cm.com_costs(t, order, N, bvp=True, eps=0.0, flat_output=False)
        b = cm.com_costs(t, order, N, bvp=True, eps=eps, flat_output=False)
        assert b.total_hash_probes >= a.total_hash_probes - 1e-9

    @given(trees())
    @settings(max_examples=25, deadline=None)
    def test_bvp_eps0_below_plain_com(self, t):
        order = t.default_order()
        a = cm.com_costs(t, order, N, flat_output=False)
        b = cm.com_costs(t, order, N, bvp=True, eps=0.0, flat_output=False)
        assert b.total_hash_probes <= a.total_hash_probes + 1e-9
