"""Strategy planner: ranks the six strategies by modeled cost."""
import pytest

from repro.core import costmodel as cm
from repro.core import jointree as jt
from repro.core.jointree import EdgeStats
from repro.core.planner import choose_plan, rank_strategies


def sized_tree(ms, fos, n=1000.0):
    stats = {c: EdgeStats(ms[c], fos[c]) for c in ms}
    t = jt.running_example(stats)
    sizes = {"R1": n}
    for c in t.bfs_order()[1:]:
        sizes[c] = sizes[t.parent[c]] * stats[c].s if stats[c].s > 0 else 1.0
    t.size.update(sizes)
    return t


HIGH_M = {"R2": 0.9, "R3": 0.8, "R4": 0.85, "R5": 0.9, "R6": 0.8}
LOW_M = {"R2": 0.05, "R3": 0.08, "R4": 0.05, "R5": 0.06, "R6": 0.05}
HIGH_FO = {c: 5.0 for c in HIGH_M}
UNIT_FO = {c: 1.0 for c in HIGH_M}


class TestRanking:
    def test_all_strategies_present(self):
        plans = rank_strategies(sized_tree(HIGH_M, HIGH_FO))
        assert sorted(p.strategy for p in plans) == sorted(cm.STRATEGIES)

    def test_sorted_by_cost(self):
        plans = rank_strategies(sized_tree(HIGH_M, HIGH_FO))
        costs = [p.cost for p in plans]
        assert costs == sorted(costs)

    def test_choose_plan_is_cheapest(self):
        t = sized_tree(HIGH_M, HIGH_FO)
        assert choose_plan(t).cost == rank_strategies(t)[0].cost

    def test_orders_valid(self):
        t = sized_tree(HIGH_M, HIGH_FO)
        for p in rank_strategies(t):
            assert t.is_valid_order(p.order)


class TestStrategySelection:
    """§5.4 qualitative behaviour of the analytic comparison."""

    def test_high_match_high_fanout_prefers_com_family(self):
        # At high m, bitvectors/semijoins prune nothing — COM wins (§5.4).
        best = choose_plan(sized_tree(HIGH_M, HIGH_FO), flat_output=False)
        assert best.strategy.endswith("COM")

    def test_com_beats_std_with_fanouts(self):
        plans = {p.strategy: p.cost for p in rank_strategies(sized_tree(HIGH_M, HIGH_FO))}
        assert plans["COM"] < plans["STD"]

    def test_low_match_makes_pruning_competitive(self):
        # At very low m, STD variants are competitive with COM (§5.2):
        # the COM family's advantage should (nearly) vanish.
        plans = {p.strategy: p.cost for p in rank_strategies(sized_tree(LOW_M, HIGH_FO))}
        assert plans["BVP+STD"] <= plans["STD"]
        assert plans["STD"] <= 2.0 * plans["COM"]

    def test_unit_fanout_com_gains_nothing_on_probes(self):
        t = sized_tree(HIGH_M, UNIT_FO)
        plans = {p.strategy: p for p in rank_strategies(t, flat_output=False)}
        assert plans["COM"].breakdown.total_hash_probes == pytest.approx(
            plans["STD"].breakdown.total_hash_probes
        )

    def test_method_optimal_not_worse(self):
        t = sized_tree(HIGH_M, HIGH_FO)
        h = choose_plan(t, method="survival").cost
        o = choose_plan(t, method="optimal").cost
        assert o <= h + 1e-9
