"""Unit tests for the vocabulary / noise substrate."""
import numpy as np
import pytest

from repro.data import vocab as V


class TestStableHash:
    def test_deterministic(self):
        assert V.stable_hash("a", 1) == V.stable_hash("a", 1)

    def test_distinct(self):
        assert V.stable_hash("a") != V.stable_hash("b")

    def test_mixes_low_bits(self):
        # short strings must still spread over the low bits (bucket modulo)
        buckets = [V.stable_hash("tok", w) % 64
                   for w in V.full_vocabulary()[:512]]
        counts = np.bincount(buckets, minlength=64)
        assert counts.max() < 30  # no catastrophic clustering

    def test_uniform_high_bits(self):
        vals = [(V.stable_hash("x", i) >> 32) / 2**32 for i in range(2000)]
        assert 0.45 < float(np.mean(vals)) < 0.55


class TestVocabulary:
    def test_nonempty_and_unique(self):
        v = V.full_vocabulary()
        assert len(v) > 2000
        assert len(v) == len(set(v))

    def test_stopwords_first(self):
        v = V.full_vocabulary()
        assert v[0] == "the"

    def test_coverage_monotone(self):
        v = V.full_vocabulary()
        in75 = sum(V.in_pretrained_vocab(t, 0.75, "WC") for t in v)
        in93 = sum(V.in_pretrained_vocab(t, 0.93, "WC") for t in v)
        assert 0.70 < in75 / len(v) < 0.80
        assert 0.90 < in93 / len(v) < 0.96
        assert in93 > in75

    def test_oov_token_never_in_vocab(self):
        assert not V.in_pretrained_vocab("zzqqxx123", 0.99, "GE")

    def test_pseudo_idf_stopword_low(self):
        assert V.pseudo_idf("the") < V.pseudo_idf(V.TERMINOLOGY[0])

    def test_pseudo_idf_unknown_is_one(self):
        assert V.pseudo_idf("zzqqxx123") == 1.0

    def test_pseudo_idf_range(self):
        for t in V.full_vocabulary()[:200]:
            assert 0.0 < V.pseudo_idf(t) <= 1.0


class TestSynthWords:
    def test_count_and_unique(self):
        w = V.synth_words(100, seed=1)
        assert len(w) == len(set(w)) == 100

    def test_deterministic(self):
        assert V.synth_words(20, seed=5) == V.synth_words(20, seed=5)

    def test_seed_sensitivity(self):
        assert V.synth_words(20, seed=5) != V.synth_words(20, seed=6)

    def test_alpha_lowercase(self):
        for w in V.synth_words(50, seed=2):
            assert w.isalpha() and w == w.lower()


class TestNoise:
    def test_typo_changes_word(self):
        g = np.random.default_rng(0)
        changed = sum(V.typo("panasonic", g) != "panasonic" for _ in range(50))
        assert changed > 40

    def test_typo_empty_ok(self):
        g = np.random.default_rng(0)
        assert V.typo("", g) == ""

    def test_corrupt_noop(self):
        g = np.random.default_rng(0)
        assert V.corrupt_text("a b c", g) == "a b c"

    def test_corrupt_typo_rate_one(self):
        g = np.random.default_rng(0)
        out = V.corrupt_text("alpha beta gamma delta", g, typo_rate=1.0,
                             max_mods=2)
        # max_mods caps modifications at 2 tokens
        orig = "alpha beta gamma delta".split()
        diff = sum(a != b for a, b in zip(orig, out.split()))
        assert diff <= 2

    def test_corrupt_drop(self):
        g = np.random.default_rng(1)
        out = V.corrupt_text("a b c d e f g h", g, drop_rate=1.0, max_mods=3)
        assert len(out.split()) == 5

    def test_corrupt_abbrev(self):
        g = np.random.default_rng(2)
        out = V.corrupt_text("jonathan", g, abbrev_rate=1.0)
        assert out == "j."

    def test_corrupt_deterministic(self):
        a = V.corrupt_text("x y z", np.random.default_rng(3), typo_rate=0.5)
        b = V.corrupt_text("x y z", np.random.default_rng(3), typo_rate=0.5)
        assert a == b
