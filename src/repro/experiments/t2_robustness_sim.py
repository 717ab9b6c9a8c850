"""T2 (Fig 6): robustness of plan choice to estimation error.

Star query with 10 dimensions; (m, fo) sampled from the paper's ranges;
statistics perturbed by a low (15–20%) or high (90–95%) multiplicative
error; regret (% cost above the true-best plan) of the plan chosen under
the selectivity cost model vs under the m/fo (COM) cost model.
"""
from __future__ import annotations

from repro.core.robustness import FO_RANGES, M_RANGES, perturbation_experiment

from .common import env_int, md_table


def run(*, n_samples: int | None = None, n_dims: int = 10, seed: int = 0):
    n_samples = n_samples or env_int("REPRO_T2_SAMPLES", 100)
    rows = []
    for err_name, err in (("low 15-20%", (0.15, 0.20)), ("high 90-95%", (0.90, 0.95))):
        results = perturbation_experiment(
            n_dims=n_dims, n_samples=n_samples, error_range=err,
            m_ranges=M_RANGES, fo_ranges=FO_RANGES, seed=seed,
        )
        for r in results:
            rows.append(
                {
                    "error": err_name,
                    "m_range": str(r.m_range),
                    "fo_range": str(r.fo_range),
                    "sel_mean_pct": r.mean("selectivity"),
                    "sel_p90_pct": r.p90("selectivity"),
                    "mfo_mean_pct": r.mean("match"),
                    "mfo_p90_pct": r.p90("match"),
                }
            )
    return rows, md_table(rows)
