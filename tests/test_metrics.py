"""Tests for pair-level metrics."""
import pandas as pd
import pytest

from repro.core.metrics import pair_precision, pair_recall, prf


@pytest.fixture(scope="module")
def frames(spark):
    cands = spark.createDataFrame(pd.DataFrame(
        {"qid": [1, 2, 3, 4], "iid": [10, 11, 12, 13]}))
    gt = spark.createDataFrame(pd.DataFrame(
        {"id1": [1, 2, 5], "id2": [10, 11, 15]}))
    return cands, gt


class TestRecallPrecision:
    def test_recall(self, frames):
        cands, gt = frames
        assert pair_recall(cands, gt) == pytest.approx(2 / 3)

    def test_precision(self, frames):
        cands, gt = frames
        assert pair_precision(cands, gt) == pytest.approx(2 / 4)

    def test_duplicate_candidates_counted_once(self, spark, frames):
        _, gt = frames
        cands = spark.createDataFrame(pd.DataFrame(
            {"qid": [1, 1, 1], "iid": [10, 10, 10]}))
        assert pair_precision(cands, gt) == 1.0
        assert pair_recall(cands, gt) == pytest.approx(1 / 3)

    def test_empty_gt(self, spark, frames):
        cands, _ = frames
        gt = spark.createDataFrame(pd.DataFrame({"id1": [], "id2": []}),
                                   schema="id1 long, id2 long")
        assert pair_recall(cands, gt) == 0.0

    def test_empty_cands(self, spark, frames):
        _, gt = frames
        cands = spark.createDataFrame(pd.DataFrame({"qid": [], "iid": []}),
                                      schema="qid long, iid long")
        assert pair_precision(cands, gt) == 0.0

    def test_oracle_intersection(self, spark, frames):
        """Recall numerator equals DuckDB's inner-join count."""
        from repro.oracle import assert_equivalent
        import pyspark.sql.functions as F

        cands, gt = frames
        got = (cands.join(gt, (cands.qid == gt.id1) & (cands.iid == gt.id2))
               .agg(F.count("*").alias("hits")))
        assert_equivalent(
            got,
            "SELECT count(*) AS hits FROM c JOIN g ON c.qid = g.id1 AND c.iid = g.id2",
            c=cands, g=gt)


class TestPrf:
    def test_perfect(self):
        assert prf(5, 5, 5) == (1.0, 1.0, 1.0)

    def test_zero_matched(self):
        assert prf(0, 5, 0) == (0.0, 0.0, 0.0)

    def test_zero_truth(self):
        assert prf(5, 0, 0) == (0.0, 0.0, 0.0)

    def test_half(self):
        p, r, f = prf(4, 4, 2)
        assert (p, r) == (0.5, 0.5)
        assert f == pytest.approx(0.5)

    def test_asymmetric(self):
        p, r, f = prf(10, 2, 2)
        assert p == 0.2 and r == 1.0
        assert f == pytest.approx(2 * 0.2 / 1.2)
