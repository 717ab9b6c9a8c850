"""T1 (Fig 4): quality of m/fo estimation — naive vs correlated sampling.

Random join pairs over dblp-lite (the paper used DBLP from the CE
benchmark), with random range predicates on both sides; Q-error of the
estimated match probability and fanout, split into low-match-probability
queries (where the paper reports naive falls apart) and the rest.
"""
from __future__ import annotations

import random

from pyspark.sql import SparkSession

from repro.ce_lite import load_dataset
from repro.ce_lite.queries import edge_true_stats
from repro.estimation import CorrelatedSample, naive_estimate, qerror

from .common import env_int, md_table, percentile

SAMPLE_SIZES = (100, 500, 2000)
LOW_M = 0.1


def run(spark: SparkSession, *, n_pairs: int | None = None, seed: int = 0):
    n_pairs = n_pairs or env_int("REPRO_T1_PAIRS", 10)
    rng = random.Random(seed)
    tables = load_dataset("dblp_lite", sf=1.0, seed=seed)
    labels = sorted(tables)
    rename = lambda df, side: df.rename(columns={"src": f"{side}_src", "dst": f"{side}_dst"})

    # Stratified pair sampling: the paper separates low-match-probability
    # queries (naive is worst there), so fill two buckets — predicates
    # with restrictive thresholds push pairs into the low-m bucket.
    want_low = n_pairs // 2
    tasks = []
    tries = 0
    while len(tasks) < n_pairs and tries < 40 * n_pairs:
        tries += 1
        r_lab, s_lab = rng.choice(labels), rng.choice(labels)
        r_end, s_end = rng.choice(["src", "dst"]), rng.choice(["src", "dst"])
        r_pdf, s_pdf = rename(tables[r_lab], "r"), rename(tables[s_lab], "s")
        r_col, s_col = f"r_{r_end}", f"s_{s_end}"
        r_other = "r_dst" if r_col == "r_src" else "r_src"
        s_other = "s_dst" if s_col == "s_src" else "s_src"
        # Low-m candidates get a restrictive S-side predicate.
        n_low = sum(1 for t in tasks if t[-1] < LOW_M)
        q_hi = rng.uniform(0.02, 0.15) if n_low < want_low else rng.uniform(0.3, 0.9)
        rq = r_pdf[r_other].quantile(rng.uniform(0.3, 0.9))
        sq = s_pdf[s_other].quantile(q_hi)
        r_pred = lambda df, c=r_other, q=rq: df[c] <= q
        s_pred = lambda df, c=s_other, q=sq: df[c] <= q
        truth = edge_true_stats(r_pdf[r_pred(r_pdf)], r_col, s_pdf[s_pred(s_pdf)], s_col)
        if truth.m <= 0:
            continue
        if (truth.m < LOW_M) != (n_low < want_low):
            continue
        tasks.append((r_pdf, s_pdf, r_col, s_col, r_pred, s_pred, truth, truth.m))

    records = []  # (estimator, true_m, qerr_m, qerr_fo)
    for r_pdf, s_pdf, r_col, s_col, r_pred, s_pred, truth, _ in tasks:
        r_df, s_df = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        s_sel = float(s_pred(s_pdf).mean())

        est_n = naive_estimate(r_df, r_col, s_df, s_col, s_pred_selectivity=s_sel)
        records.append(("naive", truth.m, qerror(est_n.m, truth.m), qerror(est_n.fo, truth.fo)))
        for n_s in SAMPLE_SIZES:
            cs = CorrelatedSample(r_df, r_col, s_df, s_col, n_sample=n_s, seed=seed)
            est = cs.estimate(r_pred=r_pred, s_pred=s_pred)
            records.append((f"sample-{n_s}", truth.m, qerror(est.m, truth.m), qerror(est.fo, truth.fo)))

    rows = []
    for est_name in ["naive"] + [f"sample-{n}" for n in SAMPLE_SIZES]:
        for group, sel in (("low-m", lambda m: m < LOW_M), ("rest", lambda m: m >= LOW_M)):
            sub = [r for r in records if r[0] == est_name and sel(r[1])]
            if not sub:
                continue
            qm = [r[2] for r in sub]
            qf = [r[3] for r in sub]
            rows.append(
                {
                    "estimator": est_name,
                    "group": group,
                    "n": len(sub),
                    "qerr_m_med": percentile(qm, 0.5),
                    "qerr_m_p90": percentile(qm, 0.9),
                    "qerr_fo_med": percentile(qf, 0.5),
                    "qerr_fo_p90": percentile(qf, 0.9),
                }
            )
    return rows, md_table(rows)
