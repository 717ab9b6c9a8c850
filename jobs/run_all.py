#!/usr/bin/env python
"""Run every evaluation table (T1–T8) and write results/tN.md files.

Scale knobs via REPRO_* env vars (see repro/experiments/*). Usage:

    python jobs/run_all.py [t1 t4 ...]   # default: all tables
"""
import os
import sys
import time

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

RESULTS = os.path.join(os.path.dirname(__file__), "..", "results")


def main(which=None):
    os.makedirs(RESULTS, exist_ok=True)
    from repro.session import get_spark

    which = which or ["t1", "t2", "t3", "t4", "t5", "t6", "t7", "t8"]
    needs_spark = {"t1", "t4", "t5", "t7", "t8"}
    spark = get_spark("repro-experiments") if needs_spark & set(which) else None

    from repro.experiments import (
        t1_estimation,
        t2_robustness_sim,
        t3_optimization,
        t4_synthetic,
        t5_ce,
        t6_simulation,
        t7_validation,
        t8_robustness_exec,
    )

    runners = {
        "t1": lambda: t1_estimation.run(spark),
        "t2": lambda: t2_robustness_sim.run(),
        "t3": lambda: t3_optimization.run(),
        "t4": lambda: t4_synthetic.run(spark),
        "t5": lambda: t5_ce.run(spark),
        "t6": lambda: t6_simulation.run(),
        "t7": lambda: t7_validation.run(spark),
        "t8": lambda: t8_robustness_exec.run(spark),
    }
    for name in which:
        t0 = time.time()
        print(f"=== {name} ...", flush=True)
        try:
            rows, md = runners[name]()
        except Exception as e:  # keep the remaining tables running
            import traceback

            traceback.print_exc()
            rows, md = [], f"FAILED: {e!r}"
        dt = time.time() - t0
        path = os.path.join(RESULTS, f"{name}.md")
        with open(path, "w") as f:
            f.write(f"# {name} ({dt:.0f}s, {len(rows)} rows)\n\n{md}\n")
        print(f"=== {name} done in {dt:.0f}s -> {path}", flush=True)
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main(sys.argv[1:] or None)
