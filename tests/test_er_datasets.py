"""Tests for the synthetic Clean-Clean datasets (paper Table 2a)."""
import numpy as np
import pandas as pd
import pytest

from repro.data.er_datasets import DATASETS, generate, generate_pandas

SMALL = ["D1", "D2", "D4"]  # cheap enough to regenerate per test module


@pytest.fixture(scope="module")
def gen():
    cache = {}

    def get(name):
        if name not in cache:
            cache[name] = generate_pandas(name)
        return cache[name]

    return get


class TestSpecTable:
    def test_ten_datasets(self):
        assert list(DATASETS) == [f"D{i}" for i in range(1, 11)]

    @pytest.mark.parametrize("name,v1,v2,d", [
        ("D1", 339, 2256, 89), ("D2", 1076, 1076, 1076),
        ("D3", 1354, 3039, 1104), ("D4", 2616, 2294, 2224),
        ("D5", 5118, 6056, 1968), ("D6", 5118, 7810, 1072),
        ("D7", 6056, 7810, 1095), ("D8", 2554, 22074, 853),
        ("D9", 2516, 61353, 2308), ("D10", 27615, 23182, 22863)])
    def test_sizes_match_paper(self, name, v1, v2, d):
        s = DATASETS[name]
        assert (s.n1, s.n2, s.n_dups) == (v1, v2, d)

    @pytest.mark.parametrize("name,a1,a2", [
        ("D1", 7, 7), ("D2", 3, 3), ("D4", 4, 4), ("D5", 13, 30),
        ("D6", 13, 9), ("D7", 30, 9), ("D10", 4, 7)])
    def test_attr_counts_match_paper(self, name, a1, a2):
        s = DATASETS[name]
        assert (s.attrs1, s.attrs2) == (a1, a2)


@pytest.mark.parametrize("name", SMALL)
class TestGeneratedData:
    def test_counts(self, gen, name):
        p1, p2, gt = gen(name)
        s = DATASETS[name]
        assert len(p1) == s.n1 and len(p2) == s.n2 and len(gt) == s.n_dups

    def test_schema(self, gen, name):
        p1, p2, _ = gen(name)
        s = DATASETS[name]
        assert list(p1.columns) == ["id"] + [f"attr{i+1}" for i in range(s.attrs1)]
        assert list(p2.columns) == ["id"] + [f"attr{i+1}" for i in range(s.attrs2)]

    def test_ids_disjoint(self, gen, name):
        p1, p2, _ = gen(name)
        assert set(p1["id"]).isdisjoint(set(p2["id"]))

    def test_gt_refers_to_real_ids(self, gen, name):
        p1, p2, gt = gen(name)
        assert set(gt["id1"]).issubset(set(p1["id"]))
        assert set(gt["id2"]).issubset(set(p2["id"]))

    def test_clean_clean(self, gen, name):
        """Clean-Clean ER: each entity matches at most one on the other side."""
        _, _, gt = gen(name)
        assert gt["id1"].is_unique and gt["id2"].is_unique

    def test_deterministic(self, gen, name):
        p1a, _, _ = generate_pandas(name)
        p1b, _, _ = gen(name)
        pd.testing.assert_frame_equal(p1a, p1b)

    def test_avg_sentence_length_near_paper(self, gen, name):
        p1, p2, _ = gen(name)

        def slen(df):
            s = (df.drop(columns=["id"]).astype(str).agg(" ".join, axis=1)
                 .str.replace(r"\s+", " ", regex=True).str.strip())
            return float(s.str.len().mean())

        measured = 0.5 * (slen(p1) + slen(p2))
        paper = DATASETS[name].paper_avg_len
        assert 0.5 * paper < measured < 1.6 * paper

    def test_duplicates_share_tokens(self, gen, name):
        """Matched entities overlap lexically more than random pairs."""
        from repro.core.tokenize import words

        p1, p2, gt = gen(name)
        s1 = p1.set_index("id").astype(str).agg(" ".join, axis=1)
        s2 = p2.set_index("id").astype(str).agg(" ".join, axis=1)

        def jac(a, b):
            ta, tb = set(words(a)), set(words(b))
            return len(ta & tb) / max(len(ta | tb), 1)

        m = np.mean([jac(s1[a], s2[b])
                     for a, b in zip(gt["id1"][:60], gt["id2"][:60])])
        g = np.random.default_rng(0)
        r = np.mean([jac(s1.iloc[int(g.integers(0, len(s1)))],
                         s2.iloc[int(g.integers(0, len(s2)))])
                     for _ in range(60)])
        assert m > r + 0.15


class TestNoiseProfiles:
    def test_d1_mostly_missing(self):
        p1, _, _ = generate_pandas("D1")
        frac_empty = (p1.drop(columns=["id"]) == "").to_numpy().mean()
        assert frac_empty > 0.5

    def test_d2_one_to_one(self):
        _, _, gt = generate_pandas("D2")
        assert len(gt) == 1076  # every entity matched (1-1 sources)

    def test_spark_generate(self, spark):
        df1, df2, gt = generate(spark, "D1")
        assert df1.count() == 339
        assert df2.count() == 2256
        assert gt.count() == 89

    def test_spark_matches_pandas(self, spark):
        df1, _, _ = generate(spark, "D1")
        p1, _, _ = generate_pandas("D1")
        got = (df1.orderBy("id").toPandas())
        pd.testing.assert_frame_equal(got, p1.reset_index(drop=True))
