"""Tests for the unsupervised matching pipeline and the end-to-end S-GTR-T5."""
import numpy as np
import pytest

from repro.core.matching import candidate_pairs, similarities, unsupervised_match
from repro.core.models import MODELS
from repro.core.pipeline import end_to_end
from repro.data.er_datasets import generate


@pytest.fixture(scope="module")
def d1(spark):
    return generate(spark, "D1")


class TestSimilarities:
    def test_formula(self):
        # paper: sim = 1 / (1 + Euclidean distance)
        assert similarities(np.array([0.0]))[0] == 1.0
        assert similarities(np.array([1.0]))[0] == 0.5

    def test_monotone_decreasing(self):
        d = np.array([0.0, 0.5, 1.0, 3.0])
        s = similarities(d)
        assert (np.diff(s) < 0).all()

    def test_range(self):
        s = similarities(np.linspace(0, 100, 50))
        assert ((s > 0) & (s <= 1)).all()


class TestCandidatePairs:
    def test_query_side_is_smaller(self, spark, d1):
        df1, df2, _ = d1  # |V1|=339 < |V2|=2256
        pairs, n_left, t_vec, t_cand = candidate_pairs(
            spark, df1, df2, MODELS["GE"], k_cand=5)
        assert n_left == 339
        assert pairs["id1"].nunique() <= 339
        assert len(pairs) == 339 * 5

    def test_orientation(self, spark, d1):
        """id1 always holds source-1 ids (offset < 1e6), id2 source-2."""
        df1, df2, _ = d1
        pairs, *_ = candidate_pairs(spark, df1, df2, MODELS["GE"], k_cand=3)
        assert (pairs["id1"] < 1_000_000).all()
        assert (pairs["id2"] >= 1_000_000).all()

    def test_swapped_sources_same_recall(self, spark, d1):
        """Source order must not change the reported blocking recall.

        (Exact candidate sets may differ on deep distance ties — D1 has
        groups of byte-identical restaurant names — but every tie-resolution
        finds the same number of true pairs.)
        """
        df1, df2, gt = d1
        gt_pd = gt.toPandas()
        gt_set = set(zip(gt_pd["id1"], gt_pd["id2"]))

        def recall(p):
            # id1/id2 follow argument order; normalize by the source-id
            # offset (source-2 ids are ≥ 1e6) before comparing to gt
            lo = p[["id1", "id2"]].min(axis=1)
            hi = p[["id1", "id2"]].max(axis=1)
            return sum((a, b) in gt_set
                       for a, b in zip(lo, hi)) / len(gt_set)

        a, *_ = candidate_pairs(spark, df1, df2, MODELS["GE"], k_cand=3)
        b, *_ = candidate_pairs(spark, df2, df1, MODELS["GE"], k_cand=3)
        assert recall(a) == pytest.approx(recall(b), abs=0.03)

    def test_all_pairs_mode(self, spark, d1):
        df1, df2, _ = d1
        pairs, *_ = candidate_pairs(spark, df1, df2, MODELS["GE"], k_cand=None)
        assert len(pairs) == 339 * 2256

    def test_sims_valid(self, spark, d1):
        df1, df2, _ = d1
        pairs, *_ = candidate_pairs(spark, df1, df2, MODELS["S5"], k_cand=5)
        assert ((pairs["sim"] > 0) & (pairs["sim"] <= 1.0 + 1e-9)).all()


class TestUnsupervisedMatch:
    def test_result_fields(self, spark, d1):
        df1, df2, gt = d1
        r = unsupervised_match(spark, df1, df2, gt, MODELS["S5"],
                               dataset="D1", k_cand=20)
        assert r.model == "S5" and r.dataset == "D1"
        assert 0 <= r.f1 <= 1
        assert len(r.sweep) == 19
        assert r.f1 == pytest.approx(r.sweep["f1"].max())

    def test_k_cand_convergence(self, spark, d1):
        """Top-200 candidates reproduce the all-pairs UMC sweep (DESIGN §5)."""
        df1, df2, gt = d1
        full = unsupervised_match(spark, df1, df2, gt, MODELS["S5"],
                                  k_cand=None)
        capped = unsupervised_match(spark, df1, df2, gt, MODELS["S5"],
                                    k_cand=200)
        assert capped.f1 == pytest.approx(full.f1, abs=0.02)

    def test_matches_one_to_one(self, spark, d1):
        df1, df2, gt = d1
        r = unsupervised_match(spark, df1, df2, gt, MODELS["GE"], k_cand=20)
        assert r.matches["id1"].is_unique
        assert r.matches["id2"].is_unique


class TestEndToEnd:
    def test_defaults(self, spark, d1):
        df1, df2, gt = d1
        r = end_to_end(spark, df1, df2, gt, dataset="D1")
        assert r.model == "S5"
        assert 0 <= r.f1 <= 1
        assert r.t_preprocess > 0
        assert r.t_match >= 0

    def test_matching_time_far_below_preprocess(self, spark, d1):
        """Paper Table 5b: t_m is milliseconds, t_p is seconds."""
        df1, df2, gt = d1
        r = end_to_end(spark, df1, df2, gt)
        assert r.t_match < r.t_preprocess

    def test_easy_dataset_high_f1(self, spark):
        df1, df2, gt = generate(spark, "D4")
        r = end_to_end(spark, df1, df2, gt, dataset="D4")
        assert r.f1 > 0.9  # paper: almost perfect on the clean D4
