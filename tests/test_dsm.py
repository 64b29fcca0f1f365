"""Tests for the DSM supervised-matching datasets (paper Table 3)."""
import pandas as pd
import pytest

from repro.data import dsm


@pytest.fixture(scope="module")
def dsm2():
    return dsm.generate_pandas("DSM2")


class TestSpecs:
    def test_five_datasets(self):
        assert list(dsm.DSM) == [f"DSM{i}" for i in range(1, 6)]

    @pytest.mark.parametrize("name,pairs,dups,attrs", [
        ("DSM1", 9575, 1028, 3), ("DSM2", 539, 132, 8),
        ("DSM3", 12363, 2220, 4), ("DSM4", 28707, 5347, 4),
        ("DSM5", 10242, 962, 5)])
    def test_counts_match_paper(self, name, pairs, dups, attrs):
        s = dsm.DSM[name]
        assert (s.total_pairs, s.duplicates, s.attrs) == (pairs, dups, attrs)


class TestGeneration:
    def test_dsm2_counts(self, dsm2):
        assert len(dsm2) == 539
        assert dsm2["label"].sum() == 132

    def test_split_60_20_20(self, dsm2):
        frac = dsm2["split"].value_counts(normalize=True)
        assert abs(frac["train"] - 0.6) < 0.02
        assert abs(frac["valid"] - 0.2) < 0.02
        assert abs(frac["test"] - 0.2) < 0.02

    def test_test_pairs_near_paper(self, dsm2):
        # paper Table 3: 110 testing pairs for DSM2 (20% split)
        assert abs(int((dsm2["split"] == "test").sum()) - 108) <= 5

    def test_columns(self, dsm2):
        s = dsm.DSM["DSM2"]
        for i in range(s.attrs):
            assert f"left_attr{i+1}" in dsm2.columns
            assert f"right_attr{i+1}" in dsm2.columns
        assert {"label", "split", "pair_id"}.issubset(dsm2.columns)

    def test_deterministic(self, dsm2):
        again = dsm.generate_pandas("DSM2")
        pd.testing.assert_frame_equal(dsm2, again)

    def test_sentences(self, dsm2):
        left = dsm.sentences(dsm2, "left")
        assert len(left) == len(dsm2)
        assert (left.str.len() > 0).all()

    def test_positives_share_more_tokens_than_negatives(self, dsm2):
        from repro.core.tokenize import words

        left = dsm.sentences(dsm2, "left")
        right = dsm.sentences(dsm2, "right")

        def jac(i):
            a, b = set(words(left[i])), set(words(right[i]))
            return len(a & b) / max(len(a | b), 1)

        pos = [jac(i) for i in dsm2.index[dsm2["label"] == 1][:80]]
        neg = [jac(i) for i in dsm2.index[dsm2["label"] == 0][:80]]
        assert sum(pos) / len(pos) > sum(neg) / len(neg)

    def test_negatives_are_hard(self, dsm2):
        """Hard negatives still share a good share of tokens (blocking-like
        candidates, not random pairs)."""
        from repro.core.tokenize import words

        left = dsm.sentences(dsm2, "left")
        right = dsm.sentences(dsm2, "right")
        neg_idx = dsm2.index[dsm2["label"] == 0][:80]
        jacs = []
        for i in neg_idx:
            a, b = set(words(left[i])), set(words(right[i]))
            jacs.append(len(a & b) / max(len(a | b), 1))
        assert sum(jacs) / len(jacs) > 0.3

    def test_stratified_split_has_positives_everywhere(self, dsm2):
        for sp in ("train", "valid", "test"):
            part = dsm2[dsm2["split"] == sp]
            assert part["label"].sum() > 0
