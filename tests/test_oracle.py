"""The DuckDB oracle itself: detects wrong results, not just crashes."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def frames(spark):
    r = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    s = pd.DataFrame({"k2": [1, 1, 3], "w": [5, 6, 7]})
    return spark.createDataFrame(r), r, s


class TestOracle:
    def test_accepts_correct_join(self, spark, frames):
        rdf, r, s = frames
        sdf = spark.createDataFrame(s)
        got = rdf.join(sdf, on=rdf.k == sdf.k2, how="inner")
        assert_equivalent(got, "SELECT * FROM r JOIN s ON k = k2", r=r, s=s)

    def test_rejects_wrong_rows(self, spark, frames):
        rdf, r, s = frames
        sdf = spark.createDataFrame(s)
        got = rdf.join(sdf, on=rdf.k == sdf.k2, how="inner").filter("w > 5")
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT * FROM r JOIN s ON k = k2", r=r, s=s)

    def test_rejects_column_mismatch(self, frames):
        rdf, r, _ = frames
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(rdf, "SELECT k AS key, v FROM r", r=r)

    def test_accepts_spark_inputs_as_tables(self, spark, frames):
        rdf, r, _ = frames
        assert_equivalent(rdf, "SELECT * FROM t", t=rdf)

    def test_column_order_insensitive(self, frames):
        rdf, r, _ = frames
        assert_equivalent(rdf.select("v", "k"), "SELECT k, v FROM r", r=r)
