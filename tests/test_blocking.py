"""Tests for exact top-k NNS blocking (plus DuckDB oracle cross-check)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.blocking import dedup_pairs, topk_pairs


def _vec_df(spark, ids, X):
    pdf = pd.DataFrame({"id": ids, "embedding": [row.tolist() for row in X]})
    return spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def small(spark):
    g = np.random.default_rng(0)
    Xq = g.standard_normal((40, 16)).astype(np.float32)
    Xi = g.standard_normal((90, 16)).astype(np.float32)
    q = _vec_df(spark, np.arange(40), Xq)
    ix = _vec_df(spark, np.arange(1000, 1090), Xi)
    return q, ix, Xq, Xi


class TestTopK:
    def test_shape(self, spark, small):
        q, ix, *_ = small
        out = topk_pairs(spark, q, ix, 5).toPandas()
        assert len(out) == 40 * 5
        assert set(out.columns) == {"qid", "iid", "dist", "rank"}

    def test_ranks_complete(self, spark, small):
        q, ix, *_ = small
        out = topk_pairs(spark, q, ix, 7).toPandas()
        per_q = out.groupby("qid")["rank"].agg(["min", "max", "count"])
        assert (per_q["min"] == 1).all()
        assert (per_q["max"] == 7).all()
        assert (per_q["count"] == 7).all()

    def test_matches_numpy_bruteforce(self, spark, small):
        q, ix, Xq, Xi = small
        out = topk_pairs(spark, q, ix, 3).toPandas()
        for qi in range(5):
            d = np.linalg.norm(Xi - Xq[qi], axis=1)
            expect = set(np.argsort(d, kind="stable")[:3] + 1000)
            got = set(out[out["qid"] == qi]["iid"])
            assert got == expect

    def test_matches_duckdb_oracle(self, spark, small):
        """Top-k pairs equal DuckDB's row_number window over the cross join
        of exact distances (the relational statement of k-NN blocking)."""
        from repro.oracle import assert_equivalent

        q, ix, Xq, Xi = small
        out = topk_pairs(spark, q, ix, 4).select("qid", "iid")
        qpd = pd.DataFrame({"qid": np.arange(40),
                            **{f"x{j}": Xq[:, j] for j in range(16)}})
        ipd = pd.DataFrame({"iid": np.arange(1000, 1090),
                            **{f"x{j}": Xi[:, j] for j in range(16)}})
        dist = "+".join(f"(q.x{j}-i.x{j})*(q.x{j}-i.x{j})" for j in range(16))
        sql = f"""
            SELECT qid, iid FROM (
              SELECT q.qid, i.iid,
                     row_number() OVER (PARTITION BY q.qid
                                        ORDER BY {dist}, i.iid) AS rn
              FROM q CROSS JOIN i) WHERE rn <= 4
        """
        assert_equivalent(out, sql, q=qpd, i=ipd)

    def test_k_larger_than_index(self, spark, small):
        q, ix, *_ = small
        out = topk_pairs(spark, q, ix, 500).toPandas()
        assert (out.groupby("qid").size() == 90).all()

    def test_exclude_self(self, spark):
        g = np.random.default_rng(1)
        X = g.standard_normal((30, 8)).astype(np.float32)
        df = _vec_df(spark, np.arange(30), X)
        out = topk_pairs(spark, df, df, 3, exclude_self=True).toPandas()
        assert (out["qid"] != out["iid"]).all()

    def test_without_exclude_self_rank1_is_self(self, spark):
        g = np.random.default_rng(2)
        X = g.standard_normal((20, 8)).astype(np.float32)
        df = _vec_df(spark, np.arange(20), X)
        out = topk_pairs(spark, df, df, 1).toPandas()
        assert (out["qid"] == out["iid"]).all()
        # float32 expanded-form distance has ~1e-3 numerical noise
        assert np.allclose(out["dist"], 0.0, atol=1e-2)

    def test_chunking_invariant(self, spark, small):
        q, ix, *_ = small
        a = topk_pairs(spark, q, ix, 5, chunk=7).toPandas()
        b = topk_pairs(spark, q, ix, 5, chunk=256).toPandas()
        key = ["qid", "rank"]
        pd.testing.assert_frame_equal(
            a.sort_values(key).reset_index(drop=True)[["qid", "iid", "rank"]],
            b.sort_values(key).reset_index(drop=True)[["qid", "iid", "rank"]])


class TestDedupPairs:
    def test_dedup(self, spark):
        cand = spark.createDataFrame(
            pd.DataFrame({"qid": [1, 2, 3], "iid": [2, 1, 1]}))
        out = dedup_pairs(cand).toPandas().sort_values(["id1", "id2"])
        assert list(map(tuple, out.to_numpy())) == [(1, 2), (1, 3)]

    def test_orders_ids(self, spark):
        cand = spark.createDataFrame(pd.DataFrame({"qid": [9], "iid": [4]}))
        out = dedup_pairs(cand).toPandas()
        assert out.iloc[0]["id1"] == 4 and out.iloc[0]["id2"] == 9
