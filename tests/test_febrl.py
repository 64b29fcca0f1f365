"""Tests for the Febrl-style Dirty-ER generator (paper Table 2b)."""
import numpy as np
import pytest

from repro.data import febrl


@pytest.fixture(scope="module")
def d10k():
    return febrl.generate_pandas(10_000, seed=0)


class TestFebrl:
    def test_size(self, d10k):
        df, _ = d10k
        assert len(df) == 10_000

    def test_schema(self, d10k):
        df, _ = d10k
        assert list(df.columns) == ["id", "cluster"] + febrl.ATTRS
        assert len(febrl.ATTRS) == 12  # Table 2b: 12 attributes

    def test_pair_count_near_paper(self, d10k):
        """Paper: 8,705 duplicate pairs at 10K entities (|D| ≈ 0.86·n)."""
        _, gt = d10k
        assert 0.78 * 10_000 < len(gt) < 0.95 * 10_000

    def test_matched_fraction(self, d10k):
        """Febrl recipe: 40% of entities belong to a duplicate cluster."""
        df, _ = d10k
        frac = (df["cluster"] >= 0).mean()
        assert 0.38 <= frac <= 0.42

    def test_max_cluster_size(self, d10k):
        """At most 9 duplicates per record (cluster size ≤ 10)."""
        df, _ = d10k
        sizes = df[df["cluster"] >= 0].groupby("cluster").size()
        assert sizes.max() <= 10
        assert sizes.min() >= 2

    def test_gt_pairs_are_intra_cluster(self, d10k):
        df, gt = d10k
        cl = df.set_index("id")["cluster"]
        sample = gt.sample(n=200, random_state=0)
        for a, b in zip(sample["id1"], sample["id2"]):
            assert cl[a] == cl[b] >= 0

    def test_gt_canonical_order(self, d10k):
        _, gt = d10k
        assert (gt["id1"] < gt["id2"]).all()

    def test_duplicates_differ_but_resemble(self, d10k):
        """Mods are bounded: a duplicate shares most characters with its
        original (≤10 modifications per record)."""
        df, gt = d10k
        s = df.set_index("id")[febrl.ATTRS].astype(str).agg(" ".join, axis=1)
        from repro.core.tokenize import words

        sims = []
        for a, b in zip(gt["id1"][:100], gt["id2"][:100]):
            ta, tb = set(words(s[a])), set(words(s[b]))
            sims.append(len(ta & tb) / max(len(ta | tb), 1))
        # numeric single-token attrs (postcode, ssn, dob) lose token identity
        # on any single char edit, so token-level overlap sits near ~0.35
        assert np.mean(sims) > 0.30

    def test_deterministic(self):
        a, _ = febrl.generate_pandas(1000, seed=7)
        b, _ = febrl.generate_pandas(1000, seed=7)
        assert a.equals(b)

    def test_seed_changes_data(self):
        a, _ = febrl.generate_pandas(1000, seed=7)
        b, _ = febrl.generate_pandas(1000, seed=8)
        assert not a.equals(b)

    def test_avg_sentence_length_near_paper(self, d10k):
        df, _ = d10k
        s = (df[febrl.ATTRS].astype(str).agg(" ".join, axis=1)
             .str.replace(r"\s+", " ", regex=True).str.strip())
        assert 60 < s.str.len().mean() < 110  # paper: 84.3

    def test_spark_generate(self, spark):
        df, gt = febrl.generate(spark, 1000, seed=0)
        assert df.count() == 1000
        assert gt.count() > 500

    @pytest.mark.parametrize("n", [500, 2000])
    def test_scales(self, n):
        df, gt = febrl.generate_pandas(n, seed=1)
        assert len(df) == n
        assert 0.7 * n < len(gt) < 1.05 * n
