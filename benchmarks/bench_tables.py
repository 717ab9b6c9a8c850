"""pytest-benchmark targets, one per evaluation table (reduced scale).

Each bench runs its table's harness once (``pedantic(rounds=1)``) at a
scale that finishes in tens of seconds; the full-scale sweeps live in
``jobs/`` and their outputs in ``results/`` / EXPERIMENTS.md. The bench
asserts the harness produced rows, so a regression in any strategy or
harness fails the bench run, and the measured time tracks the cost of
regenerating that table.
"""
import pytest

from repro.core.costmodel import STRATEGIES


def _one(benchmark, fn):
    rows = benchmark.pedantic(fn, rounds=1, iterations=1)
    assert rows
    return rows


def test_bench_t1_estimation(benchmark, spark):
    from repro.experiments import t1_estimation

    _one(benchmark, lambda: t1_estimation.run(spark, n_pairs=3, seed=0)[0])


def test_bench_t2_robustness_sim(benchmark):
    from repro.experiments import t2_robustness_sim

    rows = _one(benchmark, lambda: t2_robustness_sim.run(n_samples=40)[0])
    assert len(rows) == 24


def test_bench_t3_optimization(benchmark):
    from repro.experiments import t3_optimization

    rows = _one(benchmark, lambda: t3_optimization.run(n_trees=15, max_nodes=16)[0])
    assert len(rows) == 12


def test_bench_t4_synthetic(benchmark, spark):
    from repro.experiments import t4_synthetic

    rows = _one(
        benchmark,
        lambda: t4_synthetic.run(
            spark, n_driver=3000, shapes=["star7"], m_ranges=[(0.3, 0.6)], seed=0
        )[0],
    )
    assert rows[0]["rel_COM"] == 1.0


def test_bench_t5_ce(benchmark, spark):
    from repro.experiments import t5_ce

    rows = _one(
        benchmark, lambda: t5_ce.run(spark, n_queries=1, datasets=["imdb_lite"], seed=0)[0]
    )
    assert rows[0]["rel_COM"] == 1.0


def test_bench_t6_simulation(benchmark):
    from repro.experiments import t6_simulation

    rows = _one(benchmark, lambda: t6_simulation.run()[0])
    assert len(rows) == 72


def test_bench_t7_validation(benchmark):
    from repro.experiments import t7_validation

    rows = _one(
        benchmark, lambda: t7_validation.run(None, n_driver=3000, shapes=["star7"], seed=0)[0]
    )
    assert rows[0]["spearman_model_vs_probes"] > 0.5


def test_bench_t8_robustness(benchmark, monkeypatch):
    from repro.experiments import t8_robustness_exec

    monkeypatch.setenv("REPRO_T8_SIM_ORDERS", "5")
    rows = _one(benchmark, lambda: t8_robustness_exec.run(None, n_driver=2000, seed=0)[0])
    assert len(rows) == 4 * len(STRATEGIES)
