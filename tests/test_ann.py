"""Tests for the distributed IVF-Flat ANN index (FAISS-HNSW substitute)."""
import numpy as np
import pandas as pd
import pytest

from repro.ann.ivf import IVFIndex, _kmeans
from repro.core.blocking import topk_pairs


@pytest.fixture(scope="module")
def vecs(spark):
    g = np.random.default_rng(0)
    # clustered data so IVF's coarse quantization is meaningful
    centers = g.standard_normal((12, 32)) * 4
    X = np.concatenate([c + g.standard_normal((80, 32)) for c in centers])
    ids = np.arange(len(X))
    pdf = pd.DataFrame({"id": ids, "embedding": [r.tolist() for r in X.astype(np.float32)]})
    return spark.createDataFrame(pdf).cache(), X


class TestKMeans:
    def test_shapes(self):
        g = np.random.default_rng(1)
        X = g.standard_normal((200, 8)).astype(np.float32)
        C = _kmeans(X, 5, 4, 0)
        assert C.shape == (5, 8)

    def test_k_larger_than_n(self):
        g = np.random.default_rng(2)
        X = g.standard_normal((3, 4)).astype(np.float32)
        C = _kmeans(X, 10, 2, 0)
        assert C.shape == (3, 4)

    def test_deterministic(self):
        g = np.random.default_rng(3)
        X = g.standard_normal((100, 6)).astype(np.float32)
        np.testing.assert_array_equal(_kmeans(X, 4, 3, 7), _kmeans(X, 4, 3, 7))


class TestIVF:
    def test_build(self, spark, vecs):
        df, X = vecs
        ix = IVFIndex.build(spark, df, n_centroids=12, seed=0)
        assert ix.centroids.shape[0] == 12
        assert ix.assigned.count() == len(X)

    def test_search_returns_k(self, spark, vecs):
        df, X = vecs
        ix = IVFIndex.build(spark, df, n_centroids=12, seed=0)
        out = ix.search(df.limit(50), 5, nprobe=4).toPandas()
        assert (out.groupby("qid").size() <= 5).all()
        assert (out["rank"] <= 5).all()

    def test_high_recall_vs_exact(self, spark, vecs):
        """IVF with generous nprobe approximates exact NNS closely."""
        df, X = vecs
        ix = IVFIndex.build(spark, df, n_centroids=12, seed=0)
        approx = ix.search(df, 5, nprobe=6).toPandas()
        exact = topk_pairs(spark, df, df, 5).toPandas()
        a = set(zip(approx["qid"], approx["iid"]))
        e = set(zip(exact["qid"], exact["iid"]))
        assert len(a & e) / len(e) > 0.9

    def test_exclude_self(self, spark, vecs):
        df, _ = vecs
        ix = IVFIndex.build(spark, df, n_centroids=12, seed=0)
        out = ix.search(df.limit(40), 3, nprobe=4, exclude_self=True).toPandas()
        assert (out["qid"] != out["iid"]).all()

    def test_nprobe_monotone(self, spark, vecs):
        """More probes → strictly better (or equal) agreement with exact."""
        df, _ = vecs
        ix = IVFIndex.build(spark, df, n_centroids=12, seed=0)
        exact = topk_pairs(spark, df, df, 5).toPandas()
        e = set(zip(exact["qid"], exact["iid"]))

        def rec(nprobe):
            a = ix.search(df, 5, nprobe=nprobe).toPandas()
            return len(set(zip(a["qid"], a["iid"])) & e) / len(e)

        assert rec(6) >= rec(1) - 1e-9

    def test_default_centroids_sqrt(self, spark, vecs):
        df, X = vecs
        ix = IVFIndex.build(spark, df, seed=0)
        assert ix.centroids.shape[0] == max(4, int(np.sqrt(len(X))))
