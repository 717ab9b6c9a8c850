"""m/fo estimation: naive vs correlated sampling vs exact truth (§3.2)."""
import pandas as pd
import pytest

from repro.ce_lite import load_dataset
from repro.ce_lite.queries import edge_true_stats
from repro.estimation import CorrelatedSample, naive_estimate, qerror


class TestQError:
    def test_perfect(self):
        assert qerror(2.0, 2.0) == 1.0

    def test_symmetric(self):
        assert qerror(1.0, 4.0) == qerror(4.0, 1.0) == 4.0

    def test_zero_vs_zero(self):
        assert qerror(0.0, 0.0) == 1.0

    def test_zero_vs_positive_finite(self):
        assert qerror(0.0, 0.5) < float("inf")


@pytest.fixture(scope="module")
def pair(spark):
    """A skewed m:n join pair from dblp-lite, Spark + pandas views."""
    t = load_dataset("dblp_lite", sf=0.4, seed=2)
    r_pdf = t["writes"].rename(columns={"src": "r_src", "dst": "r_dst"})
    s_pdf = t["cites"].rename(columns={"src": "s_src", "dst": "s_dst"})
    r = spark.createDataFrame(r_pdf)
    s = spark.createDataFrame(s_pdf)
    return r, s, r_pdf, s_pdf


class TestNaive:
    def test_fanout_formula(self, pair, spark):
        r, s, _, s_pdf = pair
        est = naive_estimate(r, "r_dst", s, "s_src")
        v_s = s_pdf["s_src"].nunique()
        assert est.fo == pytest.approx(len(s_pdf) / v_s)

    def test_match_prob_formula(self, pair):
        r, s, r_pdf, s_pdf = pair
        est = naive_estimate(r, "r_dst", s, "s_src")
        v_r, v_s = r_pdf["r_dst"].nunique(), s_pdf["s_src"].nunique()
        assert est.m == pytest.approx(v_s / max(v_r, v_s))

    def test_empty_side(self, pair, spark):
        r, _, _, _ = pair
        empty = spark.createDataFrame([], schema="s_src long")
        est = naive_estimate(r, "r_dst", empty, "s_src")
        assert est.m == 0.0 and est.fo == 0.0

    def test_predicate_thinning_branch(self, pair):
        # s_p |S| < V(A,S) → fo collapses to 1.
        r, s, _, _ = pair
        est = naive_estimate(r, "r_dst", s, "s_src", s_pred_selectivity=1e-4)
        assert est.fo == 1.0

    def test_predicate_scaling_branch(self, pair):
        r, s, _, _ = pair
        full = naive_estimate(r, "r_dst", s, "s_src")
        half = naive_estimate(r, "r_dst", s, "s_src", s_pred_selectivity=0.5)
        assert half.fo == pytest.approx(0.5 * full.fo)


class TestCorrelatedSampling:
    @pytest.fixture(scope="class")
    def cs(self, pair):
        r, s, _, _ = pair
        return CorrelatedSample(r, "r_dst", s, "s_src", n_sample=800, seed=1)

    def test_no_predicate_close_to_truth(self, pair, cs):
        _, _, r_pdf, s_pdf = pair
        truth = edge_true_stats(r_pdf, "r_dst", s_pdf, "s_src")
        est = cs.estimate()
        assert qerror(est.m, truth.m) < 1.5
        assert qerror(est.fo, truth.fo) < 1.5

    def test_sampling_beats_naive_on_fanout(self, pair, cs, spark):
        # Fig 4's claim: sampling estimates fanout far better than naive
        # on skewed data (naive assumes uniform value frequencies).
        r, s, r_pdf, s_pdf = pair
        truth = edge_true_stats(r_pdf, "r_dst", s_pdf, "s_src")
        q_naive = qerror(naive_estimate(r, "r_dst", s, "s_src").fo, truth.fo)
        q_sample = qerror(cs.estimate().fo, truth.fo)
        assert q_sample <= q_naive + 0.05

    def test_predicate_on_r(self, pair, cs):
        _, _, r_pdf, s_pdf = pair
        pred = lambda df: df["r_src"] <= 100
        truth = edge_true_stats(r_pdf[r_pdf["r_src"] <= 100], "r_dst", s_pdf, "s_src")
        est = cs.estimate(r_pred=pred)
        assert qerror(est.m, truth.m) < 2.5

    def test_predicate_on_s(self, pair, cs):
        _, _, r_pdf, s_pdf = pair
        pred = lambda df: df["s_dst"] <= 500
        truth = edge_true_stats(r_pdf, "r_dst", s_pdf[s_pdf["s_dst"] <= 500], "s_src")
        est = cs.estimate(s_pred=pred)
        assert qerror(est.fo, max(truth.fo, 1e-6)) < 2.5

    def test_empty_after_predicate(self, cs):
        est = cs.estimate(r_pred=lambda df: df["r_src"] < -1)
        assert est.m == 0.0 and est.fo == 0.0

    def test_sample_bounded(self, cs):
        assert cs.n_sample <= 800
