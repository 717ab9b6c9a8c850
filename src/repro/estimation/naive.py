"""Naive uniformity/independence estimator for (m, fo) (§3.2).

For R ⋈_A S probed from R:

    s  = |S| / max(V(A,R), V(A,S))
    m  = V(A,S) / max(V(A,R), V(A,S))
    fo = |S| / V(A,S)

With a predicate of selectivity ``s_p`` on S, fo is scaled by ``s_p``
unless ``s_p·|S| < V(A,S)``, in which case the matches thin out below one
per value: fo = 1 and m = min(s_p·V(A,S)/V(A,R), 1).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.jointree import EdgeStats


def naive_estimate(
    r_df: DataFrame,
    r_col: str,
    s_df: DataFrame,
    s_col: str,
    *,
    s_pred_selectivity: float = 1.0,
) -> EdgeStats:
    """Estimate (m, fo) for probing r_df → s_df from distinct counts only."""
    v_r = r_df.select(F.countDistinct(r_col)).first()[0]
    row = s_df.select(F.countDistinct(s_col), F.count(F.lit(1))).first()
    v_s, n_s = row[0], row[1]
    if v_s == 0 or v_r == 0:
        return EdgeStats(0.0, 0.0)
    denom = max(v_r, v_s)
    sp = s_pred_selectivity
    if sp < 1.0 and sp * n_s < v_s:
        m = min(sp * v_s / v_r, 1.0)
        fo = 1.0
    else:
        m = v_s / denom
        fo = (n_s / v_s) * sp
    return EdgeStats(min(1.0, m), max(fo, 0.0))
