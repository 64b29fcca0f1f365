"""Tests for the SotA baselines: DeepBlocker-lite and ZeroER-lite."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import deepblocker, zeroer
from repro.data.er_datasets import generate


@pytest.fixture(scope="module")
def d1(spark):
    return generate(spark, "D1")


class TestAutoEncoder:
    def test_reconstruction_improves(self):
        g = np.random.default_rng(0)
        # low-rank data: AE should capture it
        U = g.standard_normal((500, 20)).astype(np.float32)
        V = g.standard_normal((20, 300)).astype(np.float32)
        X = U @ V
        ae = deepblocker.AutoEncoder(300, 150, seed=0)
        before = float(((X @ ae.W @ ae.W.T - X) ** 2).mean())
        ae.fit(X, epochs=10, seed=0)
        after = float(((X @ ae.W @ ae.W.T - X) ** 2).mean())
        assert after < before * 0.5

    def test_encode_shape(self):
        ae = deepblocker.AutoEncoder(300, 150, seed=0)
        Z = ae.encode(np.zeros((7, 300), dtype=np.float32))
        assert Z.shape == (7, 150)

    def test_preserves_neighbourhoods(self):
        g = np.random.default_rng(1)
        X = g.standard_normal((300, 300)).astype(np.float32)
        X[1] = X[0] + 0.01 * g.standard_normal(300)
        ae = deepblocker.AutoEncoder(300, 150, seed=0).fit(X, epochs=5)
        Z = ae.encode(X)
        d = np.linalg.norm(Z - Z[0], axis=1)
        d[0] = np.inf
        assert d.argmin() == 1

    def test_stochastic_in_seed(self):
        g = np.random.default_rng(2)
        X = g.standard_normal((200, 300)).astype(np.float32)
        a = deepblocker.AutoEncoder(300, 150, seed=0).fit(X, epochs=2).W
        b = deepblocker.AutoEncoder(300, 150, seed=1).fit(X, epochs=2).W
        assert not np.allclose(a, b)


class TestDeepBlocker:
    def test_block(self, spark, d1):
        df1, df2, gt = d1
        r = deepblocker.block(spark, df1, df2, 10, seed=0)
        assert isinstance(r, deepblocker.BlockingResult)
        assert (r.cands.groupby("qid").size() <= 10).all()
        assert r.t_total >= r.t_vectorize

    def test_decent_recall_on_d1(self, spark, d1):
        df1, df2, gt = d1
        r = deepblocker.block(spark, df1, df2, 10, seed=0)
        gt_pd = gt.toPandas()
        gt_set = set(zip(gt_pd["id1"], gt_pd["id2"]))
        lo = r.cands[["qid", "iid"]].min(axis=1)
        hi = r.cands[["qid", "iid"]].max(axis=1)
        rec = sum((a, b) in gt_set for a, b in zip(lo, hi)) / len(gt_set)
        assert rec > 0.6


class TestZeroERFeatures:
    def test_jaccard(self):
        assert zeroer._jaccard({"a", "b"}, {"b", "c"}) == pytest.approx(1 / 3)
        assert zeroer._jaccard(set(), set()) == 1.0
        assert zeroer._jaccard({"a"}, set()) == 0.0

    def test_grams(self):
        assert "abc" in zeroer._grams("abc def")
        assert zeroer._grams("ab") == {"ab"}

    def test_pair_features_identical(self):
        p = pd.DataFrame({"id": [1], "a": ["sony tv"], "b": ["black"]})
        e = zeroer._precompute(p, 2)
        f = zeroer.pair_features(e[1], e[1], 2)
        assert f == [1.0, 1.0, 1.0, 1.0] * 2

    def test_pair_features_disjoint(self):
        p = pd.DataFrame({"id": [1, 2], "a": ["sony tv", "canon camera"]})
        e = zeroer._precompute(p, 1)
        f = zeroer.pair_features(e[1], e[2], 1)
        assert f[0] == 0.0 and f[2] == 0.0


class TestGMM:
    def test_separates_two_gaussians(self):
        g = np.random.default_rng(0)
        lo = g.normal(0.1, 0.05, (5000, 4))
        hi = g.normal(0.9, 0.05, (25, 4))
        X = np.vstack([lo, hi])
        probs = zeroer.GMM2().fit_predict(X)
        assert (probs[-25:] > 0.5).all()
        assert (probs[:5000] < 0.5).mean() > 0.99

    def test_degenerate_input(self):
        X = np.zeros((50, 4))
        probs = zeroer.GMM2().fit_predict(X)
        assert (np.asarray(probs) <= 1).all()


class TestZeroEREndToEnd:
    def test_overlap_blocking(self, spark, d1):
        df1, df2, _ = d1
        cand = zeroer.overlap_blocking(spark, df1, df2)
        assert {"id1", "id2"} == set(cand.columns)
        assert len(cand) > 0
        # far below the cross product
        assert len(cand) < 339 * 2256 / 4

    def test_run_d1_fails_like_paper(self, spark, d1):
        """Schema-based ZeroER collapses on D1's missing/misplaced values
        (paper: F1 = 0; we assert 'very poor')."""
        df1, df2, gt = d1
        r = zeroer.run(spark, df1, df2, gt)
        assert r.f1 < 0.35

    def test_run_d4_succeeds_like_paper(self, spark):
        """Clean bibliographic data is ZeroER's easy case (paper: ~1.0)."""
        df1, df2, gt = generate(spark, "D4")
        r = zeroer.run(spark, df1, df2, gt)
        assert r.f1 > 0.9
        assert r.t_preprocess > r.t_match
