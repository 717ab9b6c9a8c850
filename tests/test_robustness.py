"""Robustness formulas and the Fig 6 perturbation simulation."""
import random

import pytest

from repro.core import robustness as rb
from repro.core import jointree as jt
from repro.core import optimizer as opt
from repro.core.jointree import EdgeStats


class TestClosedForms:
    def test_theta_geometric_sum(self):
        # (1 - s^{n-1})/(1-s) = 1 + s + ... + s^{n-2}.
        s, n = 0.3, 6
        want = sum(s**i for i in range(n - 1))
        assert rb.theta_selectivity(s, n) == pytest.approx(want)

    def test_theta_s_equal_one_limit(self):
        assert rb.theta_selectivity(1.0, 5) == 4.0

    def test_big_theta_matches_sum(self):
        smin, smax, n = 0.2, 0.8, 6
        want = sum(smax**i - smin**i for i in range(1, n - 1)) / (smax - smin)
        assert rb.big_theta_selectivity(smin, smax, n) == pytest.approx(want)

    def test_big_theta_degenerate_range(self):
        # Limit s_max -> s_min: derivative of Σ s^i.
        got = rb.big_theta_selectivity(0.5, 0.5, 6)
        lim = rb.big_theta_selectivity(0.5, 0.5 + 1e-9, 6)
        assert got == pytest.approx(lim, rel=1e-4)

    def test_match_theta_smaller_than_selectivity_theta_with_fanout(self):
        # With fanouts > 1, s > m, so the m-based θ (spread of the plan
        # space) is smaller — the robustness claim of §3.7.
        m, fo, n = 0.4, 5.0, 8
        assert rb.theta_match(m, n) < rb.theta_selectivity(min(m * fo, 0.99), n) or m * fo >= 1

    def test_theta_monotone_in_n(self):
        assert rb.theta_selectivity(0.5, 8) > rb.theta_selectivity(0.5, 4)


class TestEmpiricalSpread:
    def test_com_plan_space_narrower_than_std_on_star(self):
        # Normalized spread (max/min cost over all orders) must be smaller
        # under the COM cost model than under STD for a fanout-heavy star.
        rng = random.Random(3)
        stats = {f"R{i}": EdgeStats(rng.uniform(0.3, 0.9), float(rng.randint(3, 9))) for i in range(2, 7)}
        t = jt.star(5, stats)
        lo_c, hi_c = rb.plan_space_spread(t, opt.com_probes_fn(t, 1.0))
        lo_s, hi_s = rb.plan_space_spread(t, opt.std_probes_fn(t, 1.0))
        assert hi_c / lo_c < hi_s / lo_s

    def test_star_com_cost_within_theta_bounds_structure(self):
        # For a star under COM, every plan's cost is Σ prefix-products of
        # m — the worst/best deviation stays below the θ bound scaled by
        # (m_max - m_min) · N, by construction of the bound.
        stats = {f"R{i}": EdgeStats(0.2 + 0.1 * i / 10, 3.0) for i in range(2, 8)}
        t = jt.star(6, stats)
        lo, hi = rb.plan_space_spread(t, opt.com_probes_fn(t, 1.0))
        ms = [t.stats[c].m for c in t.nonroot]
        spread = (hi - lo) / (max(ms) - min(ms))
        assert spread <= rb.big_theta_match(min(ms), max(ms), len(ms) + 1) + 1e-6


class TestPerturbation:
    def test_trial_returns_nonnegative_regrets(self):
        rng = random.Random(0)
        for _ in range(10):
            a, b = rb.perturbation_trial(rng, 6, (0.1, 0.5), (1, 10), (0.15, 0.2))
            assert a >= 0 and b >= 0

    def test_zero_error_zero_regret(self):
        rng = random.Random(1)
        a, b = rb.perturbation_trial(rng, 6, (0.1, 0.5), (1, 10), (0.0, 0.0))
        assert a == pytest.approx(0.0, abs=1e-9)
        assert b == pytest.approx(0.0, abs=1e-9)

    def test_experiment_grid_shape(self):
        res = rb.perturbation_experiment(
            n_dims=5, n_samples=5, m_ranges=[(0.1, 0.5)], fo_ranges=[(1, 10), (10, 100)]
        )
        assert len(res) == 2
        assert all(len(r.pct_diff_match) == 5 for r in res)

    def test_match_model_more_robust_under_high_error_high_fanout(self):
        # The headline Fig 6 claim: with 90-95% estimation error and
        # fanouts in [10,100], the m/fo model's regret is much smaller
        # than the selectivity model's (on average).
        res = rb.perturbation_experiment(
            n_dims=8,
            n_samples=40,
            error_range=(0.90, 0.95),
            m_ranges=[(0.1, 0.5)],
            fo_ranges=[(10.0, 100.0)],
            seed=2,
        )[0]
        assert res.mean("match") < res.mean("selectivity")

    def test_low_fanout_models_behave_similarly(self):
        # Fig 6: with fo in [1,2] both models show similar behaviour.
        res = rb.perturbation_experiment(
            n_dims=8,
            n_samples=40,
            error_range=(0.15, 0.2),
            m_ranges=[(0.1, 0.5)],
            fo_ranges=[(1.0, 2.0)],
            seed=3,
        )[0]
        # "Similar": same order of magnitude (ratio < 10) or both tiny.
        a, b = res.mean("selectivity"), res.mean("match")
        assert b <= a + 5.0 or a < 1.0

    def test_p90_statistic(self):
        r = rb.PerturbationResult((0, 1), (0, 1), (0, 0), list(range(10)), list(range(10)))
        assert r.p90("match") == 9
        assert r.mean("match") == pytest.approx(4.5)
