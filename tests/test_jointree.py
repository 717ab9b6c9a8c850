"""Join-tree IR: structure, orders, rerooting, shape constructors."""
import random

import pytest

from repro.core import jointree as jt
from repro.core.jointree import EdgeStats, JoinTree, SymmetricStats


def ex():
    return jt.running_example()


class TestEdgeStats:
    def test_selectivity_is_product(self):
        assert EdgeStats(0.5, 4.0).s == 2.0

    @pytest.mark.parametrize("m", [-0.1, 1.1])
    def test_bad_match_probability_rejected(self, m):
        with pytest.raises(ValueError):
            EdgeStats(m, 1.0)

    def test_negative_fanout_rejected(self):
        with pytest.raises(ValueError):
            EdgeStats(0.5, -1.0)

    @pytest.mark.parametrize("m", [0.0, 1.0])
    def test_boundary_match_probability_ok(self, m):
        assert EdgeStats(m, 1.0).m == m


class TestStructure:
    def test_nodes(self):
        assert sorted(ex().nodes) == ["R1", "R2", "R3", "R4", "R5", "R6"]

    def test_children(self):
        t = ex()
        assert sorted(t.children("R1")) == ["R2", "R5"]
        assert sorted(t.children("R2")) == ["R3", "R4"]
        assert t.children("R3") == []

    def test_path_from_root(self):
        assert ex().path_from_root("R4") == ["R1", "R2", "R4"]
        assert ex().path_from_root("R1") == ["R1"]

    def test_depth(self):
        t = ex()
        assert t.depth("R1") == 0
        assert t.depth("R2") == 1
        assert t.depth("R6") == 2

    def test_subtree(self):
        assert sorted(ex().subtree("R2")) == ["R2", "R3", "R4"]

    def test_bottom_up_children_before_parents(self):
        t = ex()
        order = t.bottom_up()
        for c, p in t.parent.items():
            assert order.index(c) < order.index(p)

    def test_root_with_parent_rejected(self):
        with pytest.raises(ValueError):
            JoinTree("R1", {"R1": "R2", "R2": "R1"}, {"R1": EdgeStats(1, 1), "R2": EdgeStats(1, 1)})

    def test_missing_stats_rejected(self):
        with pytest.raises(ValueError):
            JoinTree("R1", {"R2": "R1"}, {})

    def test_unknown_parent_rejected(self):
        with pytest.raises(ValueError):
            JoinTree("R1", {"R2": "R9"}, {"R2": EdgeStats(1, 1)})

    def test_stats_for_unknown_node_rejected(self):
        with pytest.raises(ValueError):
            JoinTree("R1", {"R2": "R1"}, {"R2": EdgeStats(1, 1), "R9": EdgeStats(1, 1)})


class TestOrders:
    def test_bfs_default_order_is_valid(self):
        t = ex()
        assert t.is_valid_order(t.default_order())

    def test_child_before_parent_invalid(self):
        assert not ex().is_valid_order(["R3", "R2", "R4", "R5", "R6"])

    def test_wrong_node_set_invalid(self):
        assert not ex().is_valid_order(["R2", "R3", "R4", "R5"])

    def test_eligible_initial(self):
        assert sorted(ex().eligible(set())) == ["R2", "R5"]

    def test_eligible_after_r2(self):
        assert sorted(ex().eligible({"R2"})) == ["R3", "R4", "R5"]

    def test_valid_orders_all_valid_and_distinct(self):
        t = ex()
        orders = list(t.valid_orders())
        assert all(t.is_valid_order(o) for o in orders)
        assert len({tuple(o) for o in orders}) == len(orders)

    def test_valid_order_count_running_example(self):
        # Linear extensions of the precedence forest {R2->(R3,R4), R5->R6}:
        # 5! / (3*1*1*2*1) = 20 by the hook-length formula for forests.
        assert len(list(ex().valid_orders())) == 20


class TestShapes:
    def test_star(self):
        t = jt.star(6)
        assert len(t.nonroot) == 6
        assert all(t.parent[c] == "R1" for c in t.nonroot)

    def test_path(self):
        t = jt.path(11)
        assert len(t.nonroot) == 10
        assert t.depth("R11") == 10

    def test_centered_path(self):
        t = jt.centered_path(11)
        assert t.root == "R6"
        assert max(t.depth(n) for n in t.nodes) == 5

    def test_centered_path_too_small(self):
        with pytest.raises(ValueError):
            jt.centered_path(2)

    @pytest.mark.parametrize("nc,ng,total", [(3, 2, 9), (5, 1, 10)])
    def test_snowflake(self, nc, ng, total):
        t = jt.snowflake(nc, ng)
        assert len(t.nonroot) == total
        assert len(t.children(t.root)) == nc

    def test_running_example_edges(self):
        t = jt.running_example()
        assert t.parent == {"R2": "R1", "R3": "R2", "R4": "R2", "R5": "R1", "R6": "R5"}


class TestRandomTree:
    @pytest.mark.parametrize("seed", range(8))
    def test_random_tree_valid(self, seed):
        t = jt.random_tree(random.Random(seed), max_nodes=20)
        assert 2 <= len(t.nodes) <= 20
        assert t.is_valid_order(t.default_order())

    def test_random_tree_respects_ranges(self):
        t = jt.random_tree(random.Random(1), max_nodes=15, m_range=(0.2, 0.3), fo_range=(2, 4))
        for c in t.nonroot:
            assert 0.2 <= t.stats[c].m <= 0.3
            assert 2 <= t.stats[c].fo <= 4

    def test_root_child_count_range(self):
        for seed in range(10):
            t = jt.random_tree(random.Random(seed), max_nodes=30, root_children=(2, 5))
            assert 2 <= len(t.children(t.root)) <= 5


class TestReroot:
    def _sym(self, t):
        table = {}
        for c, p in t.parent.items():
            table[(p, c)] = t.stats[c]
            table[(c, p)] = EdgeStats(min(1.0, t.stats[c].m + 0.1), 1.5)
        return SymmetricStats(table)

    def test_reroot_preserves_node_set(self):
        t = ex()
        r = t.rerooted("R3", self._sym(t))
        assert sorted(r.nodes) == sorted(t.nodes)
        assert r.root == "R3"

    def test_reroot_flips_path_edges(self):
        t = ex()
        r = t.rerooted("R2", self._sym(t))
        assert r.parent["R1"] == "R2"
        assert r.parent["R3"] == "R2"
        assert r.parent["R5"] == "R1"

    def test_reroot_same_root_identity_structure(self):
        t = ex()
        r = t.rerooted("R1", self._sym(t))
        assert r.parent == t.parent

    def test_reroot_unknown_node(self):
        with pytest.raises(ValueError):
            ex().rerooted("R99", self._sym(ex()))

    def test_reroot_join_cols_flipped(self):
        t = ex()
        t.join_cols = {c: (f"{p}_k", f"{c}_k") for c, p in t.parent.items()}
        r = t.rerooted("R2", self._sym(t))
        # Edge R2->R1 is flipped: parent col is now R2's key.
        assert r.join_cols["R1"] == ("R2_k", "R1_k")
        # Unflipped edge keeps its binding.
        assert r.join_cols["R3"] == ("R2_k", "R3_k")
