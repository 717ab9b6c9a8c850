"""Experiment harnesses T1–T8: smoke runs at reduced scale + headline
qualitative claims of the paper's evaluation."""
import random

import pytest

from repro.core.costmodel import STRATEGIES
from repro.experiments import (
    t2_robustness_sim,
    t3_optimization,
    t6_simulation,
)
from repro.experiments.common import md_table, percentile, random_valid_order
from repro.experiments.shapes import SHAPES, sample_shaped_tree


class TestCommon:
    def test_md_table_renders(self):
        md = md_table([{"a": 1, "b": 2.5}, {"a": 3, "b": 4.0}])
        assert md.startswith("| a | b |")
        assert "| 3 | 4 |" in md

    def test_md_table_empty(self):
        assert md_table([]) == "(no rows)"

    def test_percentile(self):
        xs = [float(i) for i in range(10)]
        assert percentile(xs, 0.5) == 5.0
        assert percentile(xs, 0.9) == 9.0

    @pytest.mark.parametrize("shape", sorted(SHAPES))
    def test_random_valid_orders(self, shape):
        rng = random.Random(0)
        t = sample_shaped_tree(shape, rng, m_range=(0.2, 0.5), n_driver=1000)
        for _ in range(5):
            assert t.is_valid_order(random_valid_order(t, rng))

    def test_sample_shaped_tree_bounds_output(self):
        from repro.core.costmodel import expected_output

        rng = random.Random(1)
        t = sample_shaped_tree("star7", rng, m_range=(0.3, 0.6), n_driver=10_000, max_out=1e6)
        assert expected_output(t, 10_000) <= 1e6

    def test_unknown_shape(self):
        with pytest.raises(ValueError):
            sample_shaped_tree("cycle", random.Random(0), m_range=(0.1, 0.5))


class TestT2:
    def test_grid_and_headline(self):
        rows, md = t2_robustness_sim.run(n_samples=25, n_dims=8)
        assert len(rows) == 24  # 4 m-ranges × 3 fo-ranges × 2 error levels
        # Headline: averaged over the high-error high-fanout cells, the
        # m/fo model's regret is below the selectivity model's.
        hi = [r for r in rows if r["error"].startswith("high") and "10.0, 100" in r["fo_range"]]
        assert sum(r["mfo_mean_pct"] for r in hi) < sum(r["sel_mean_pct"] for r in hi)
        assert "| error |" in md.splitlines()[0] or "error" in md.splitlines()[0]


class TestT3:
    def test_survival_near_optimal_rank_worst(self):
        rows, _ = t3_optimization.run(n_trees=12, max_nodes=14)
        assert len(rows) == 12  # 4 ranges × 3 heuristics
        by = {(r["m_range"], r["heuristic"]): r for r in rows}
        for mr in {r["m_range"] for r in rows}:
            assert by[(mr, "survival")]["median"] <= by[(mr, "rank")]["median"] + 1e-9
        # Ratios are >= 1 by construction (optimal is a lower bound).
        assert all(r["median"] >= 1.0 - 1e-9 for r in rows)


class TestT6:
    @pytest.fixture(scope="class")
    def rows(self):
        rows, _ = t6_simulation.run()
        return rows

    def test_grid(self, rows):
        assert len(rows) == 4 * 2 * 9

    def test_com_best_at_high_match_probability(self, rows):
        # §5.4: at the highest m, plain COM wins (pruning probes wasted).
        # SJ+COM can land in a hairline tie (<1%) on deep paths, so assert
        # COM is within 1% of the per-cell best.
        for shape in sorted(SHAPES):
            for r in (x for x in rows if x["shape"] == shape and x["m"] == 0.9):
                best_cost = min(r[s] for s in ("COM", "BVP+STD", "BVP+COM", "SJ+STD", "SJ+COM"))
                assert r["COM"] <= 1.01 * best_cost

    def test_bvp_com_best_at_low_match_probability(self, rows):
        # §5.4: at low m the bitvector variant wins by pruning early.
        lows = [r for r in rows if r["m"] == 0.1]
        assert sum(r["best"] == "BVP+COM" for r in lows) >= len(lows) * 0.5

    def test_com_variants_beat_std_variants_at_high_m_high_fo(self, rows):
        for r in rows:
            if r["m"] >= 0.7 and r["fo"] == 5.0:
                assert r["COM"] < r["BVP+STD"]
                assert r["SJ+COM"] < r["SJ+STD"]

    def test_cost_increases_with_m(self, rows):
        for shape in sorted(SHAPES):
            xs = [r["COM"] for r in rows if r["shape"] == shape and r["fo"] == 2.0]
            assert xs == sorted(xs)


@pytest.mark.spark_experiments
class TestSparkExperimentsSmoke:
    """Tiny-scale end-to-end runs of the Spark-bound harnesses."""

    def test_t1(self, spark):
        from repro.experiments import t1_estimation

        rows, md = t1_estimation.run(spark, n_pairs=3, seed=1)
        assert rows and all(r["qerr_fo_med"] >= 1.0 for r in rows)
        assert "estimator" in md

    def test_t4_single_cell(self, spark):
        from repro.experiments import t4_synthetic

        rows, _ = t4_synthetic.run(
            spark, n_driver=2000, shapes=["star7"], m_ranges=[(0.3, 0.6)], seed=1
        )
        assert len(rows) == 1
        r = rows[0]
        assert r["rel_COM"] == 1.0
        for s in STRATEGIES:
            assert f"rel_{s}" in r and f"model_rel_{s}" in r

    def test_t5_single_query(self, spark):
        from repro.experiments import t5_ce

        rows, _ = t5_ce.run(spark, n_queries=1, datasets=["dblp_lite"], seed=2)
        assert len(rows) == 1
        assert rows[0]["rel_COM"] == 1.0

    def test_t7_sim_only(self):
        from repro.experiments import t7_validation

        rows, _ = t7_validation.run(None, n_driver=3000, shapes=["snow32"], seed=3)
        assert len(rows) == 1
        # The model must track simulated probes tightly on model-friendly data.
        assert rows[0]["spearman_model_vs_probes"] > 0.8

    def test_t8_sim_only(self, monkeypatch):
        from repro.experiments import t8_robustness_exec

        monkeypatch.setenv("REPRO_T8_SIM_ORDERS", "5")
        rows, _ = t8_robustness_exec.run(None, n_driver=2000, seed=4)
        assert len(rows) == 4 * len(STRATEGIES)
        by = {(r["query"], r["strategy"]): r for r in rows}
        queries = {r["query"] for r in rows}
        for q in queries:
            # Thm 3.5: SJ+COM probe totals don't vary with the order.
            assert by[(q, "SJ+COM")]["probes_cv"] == pytest.approx(0.0, abs=1e-9)
        # COM is flatter than STD on average (the paper's claim is about
        # the distribution over queries, not each query individually).
        mean_cv = lambda s: sum(by[(q, s)]["probes_cv"] for q in queries) / len(queries)
        assert mean_cv("COM") <= mean_cv("STD") + 1e-9
