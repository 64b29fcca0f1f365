"""Unit tests for tokenization and sentence construction."""
import pytest
from hypothesis import given, strategies as st

from repro.core.tokenize import char_ngrams, sentence_expr, with_sentence, words


class TestWords:
    def test_basic(self):
        assert words("Sony DCR-HC21 Camcorder") == ["sony", "dcr", "hc21", "camcorder"]

    def test_empty(self):
        assert words("") == []

    def test_none(self):
        assert words(None) == []

    def test_punctuation_only(self):
        assert words("!!! --- ...") == []

    def test_lowercases(self):
        assert words("ABC Def") == ["abc", "def"]

    def test_digits_kept(self):
        assert words("4k tv 2020") == ["4k", "tv", "2020"]

    @given(st.text(max_size=80))
    def test_always_lowercase_alnum(self, s):
        for t in words(s):
            assert t == t.lower()
            assert t.isalnum()


class TestCharNgrams:
    def test_short_token_has_whole_word_gram(self):
        assert char_ngrams("ab") == ["<ab", "ab>", "<ab>"]

    def test_boundary_markers(self):
        grams = char_ngrams("cat")
        assert "<ca" in grams and "at>" in grams and "<cat>" in grams

    def test_counts(self):
        # token of length L → (L+2-n+1) grams per n in 3..5
        grams = char_ngrams("abcdef")  # marked length 8
        assert len(grams) == 6 + 5 + 4

    def test_single_char(self):
        assert char_ngrams("x") == ["<x>"]

    def test_typo_shares_most_grams(self):
        a = set(char_ngrams("panasonic"))
        b = set(char_ngrams("panasonik"))
        assert len(a & b) / len(a | b) > 0.4

    def test_different_words_share_few_grams(self):
        a = set(char_ngrams("panasonic"))
        b = set(char_ngrams("keyboard"))
        assert len(a & b) / len(a | b) < 0.1

    @given(st.text(alphabet="abcdefg", min_size=1, max_size=12))
    def test_nonempty(self, s):
        assert char_ngrams(s)


class TestSentence:
    def test_with_sentence(self, spark):
        df = spark.createDataFrame(
            [(1, "sony", "camera"), (2, None, "tv")],
            ["id", "attr1", "attr2"])
        out = {r["id"]: r["sentence"]
               for r in with_sentence(df).collect()}
        assert out[1] == "sony camera"
        assert out[2] == "tv"

    def test_sentence_skips_id(self, spark):
        df = spark.createDataFrame([(7, "a")], ["id", "attr1"])
        row = with_sentence(df).collect()[0]
        assert row["sentence"] == "a"

    def test_explicit_attrs(self, spark):
        df = spark.createDataFrame([(1, "x", "y")], ["id", "a", "b"])
        row = with_sentence(df, attr_cols=["b"]).collect()[0]
        assert row["sentence"] == "y"

    def test_numeric_attrs_cast(self, spark):
        df = spark.createDataFrame([(1, 42, "x")], ["id", "n", "s"])
        row = with_sentence(df).collect()[0]
        assert "42" in row["sentence"]

    def test_oracle_concat(self, spark):
        """Sentence construction agrees with DuckDB's concat_ws over nulls."""
        from repro.oracle import assert_equivalent

        df = spark.createDataFrame(
            [(1, "a", None), (2, None, "b"), (3, "a", "b")],
            ["id", "x", "y"])
        got = with_sentence(df).select("id", "sentence")
        assert_equivalent(
            got,
            "SELECT id, trim(concat_ws(' ', coalesce(x, ''), coalesce(y, ''))) "
            "AS sentence FROM t",
            t=df,
        )
