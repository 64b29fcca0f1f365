"""Unit tests for the surrogate language models (paper Table 1)."""
import numpy as np
import pytest

from repro.core import models as M

ALL = list(M.MODELS)
STATIC = [c for c in ALL if M.MODELS[c].family == "static"]
DYNAMIC = [c for c in ALL if M.MODELS[c].family != "static"]
SBERT = [c for c in ALL if M.MODELS[c].family == "sbert"]

SENTS = [
    "sony dcr hc21 mini dv digital handycam camcorder",
    "panasonic black portable dvd player lcd screen",
    "efficient query optimization for distributed database systems",
    "the dark night river",
    "",
]


class TestRegistry:
    def test_twelve_models(self):
        assert len(M.MODELS) == 12

    @pytest.mark.parametrize("code,dim", [
        ("WC", 300), ("FT", 300), ("GE", 300), ("BT", 768), ("AT", 768),
        ("RA", 768), ("DT", 768), ("XT", 768), ("ST", 768), ("S5", 768),
        ("SA", 768), ("SM", 384)])
    def test_dims_match_table1(self, code, dim):
        assert M.MODELS[code].dim == dim

    @pytest.mark.parametrize("code,seq", [
        ("BT", 100), ("AT", 100), ("RA", 100), ("DT", 100), ("XT", 100),
        ("ST", 384), ("S5", 512), ("SA", 512), ("SM", 256)])
    def test_max_seq_match_table1(self, code, seq):
        assert M.MODELS[code].max_seq == seq

    @pytest.mark.parametrize("code,params", [
        ("BT", 110), ("AT", 12), ("RA", 125), ("DT", 66), ("XT", 110),
        ("ST", 110), ("S5", 110), ("SM", 22)])
    def test_params_match_table1(self, code, params):
        assert M.MODELS[code].params_m == params

    def test_static_models_have_no_seq_limit(self):
        for c in STATIC:
            assert M.MODELS[c].max_seq is None

    def test_supervised_excludes_wc_and_s5(self):
        assert "WC" not in M.SUPERVISED_MODELS
        assert "S5" not in M.SUPERVISED_MODELS
        assert len(M.SUPERVISED_MODELS) == 10


@pytest.mark.parametrize("code", ALL)
class TestEmbedBasics:
    def test_shape_and_dtype(self, code):
        spec = M.MODELS[code]
        out = M.embed_batch(spec, SENTS)
        assert out.shape == (len(SENTS), spec.dim)
        assert out.dtype == np.float32

    def test_deterministic(self, code):
        spec = M.MODELS[code]
        a = M.embed_batch(spec, SENTS[:2])
        b = M.embed_batch(spec, SENTS[:2])
        np.testing.assert_array_equal(a, b)

    def test_batch_independence(self, code):
        """Embedding alone vs inside a batch gives the same vector."""
        spec = M.MODELS[code]
        alone = M.embed_batch(spec, [SENTS[0]])[0]
        batched = M.embed_batch(spec, SENTS[:3])[0]
        np.testing.assert_allclose(alone, batched, atol=1e-4)

    def test_empty_text_is_zero(self, code):
        spec = M.MODELS[code]
        v = M.embed_batch(spec, [""])[0]
        assert np.linalg.norm(v) < 1e-6

    def test_finite(self, code):
        out = M.embed_batch(M.MODELS[code], SENTS)
        assert np.isfinite(out).all()


@pytest.mark.parametrize("code", DYNAMIC)
class TestDynamic:
    def test_normalized(self, code):
        out = M.embed_batch(M.MODELS[code], SENTS[:4])
        norms = np.linalg.norm(out, axis=1)
        np.testing.assert_allclose(norms, 1.0, atol=1e-4)

    def test_truncation(self, code):
        """Tokens beyond max_seq do not change the embedding."""
        spec = M.MODELS[code]
        base = "tok" + " tok".join(str(i) for i in range(spec.max_seq))
        longer = base + " extraword extraword2"
        a = M.embed_batch(spec, [base])[0]
        b = M.embed_batch(spec, [longer])[0]
        np.testing.assert_allclose(a, b, atol=1e-5)

    def test_finetuned_flag(self, code):
        ft = M.MODELS[code].finetuned()
        assert ft.is_finetuned
        assert ft.mix_lambda <= M.MODELS[code].mix_lambda
        assert ft.idf

    def test_finetuned_differs(self, code):
        a = M.embed_batch(M.MODELS[code], SENTS[:1])
        b = M.embed_batch(M.MODELS[code].finetuned(), SENTS[:1])
        assert not np.allclose(a, b)


class TestStaticSemantics:
    def test_oov_dropped_by_glove(self):
        """A pure-OOV sentence embeds to zero for dictionary models."""
        for code in ("WC", "GE"):
            v = M.embed_batch(M.MODELS[code], ["zzqqx9 qqzzy8"])[0]
            assert np.linalg.norm(v) < 1e-6, code

    def test_fasttext_handles_oov(self):
        v = M.embed_batch(M.MODELS["FT"], ["zzqqx9 qqzzy8"])[0]
        assert np.linalg.norm(v) > 0.1

    def test_fasttext_typo_robust(self):
        """A typo moves FastText less than it moves GloVe (which drops the
        token entirely) — the paper's core static-model distinction."""
        clean = "panasonic portable camera"
        typo = "panasonik portable camera"

        def delta(code):
            a, b = M.embed_batch(M.MODELS[code], [clean, typo])
            return np.linalg.norm(a - b)

        assert delta("FT") < delta("GE")

    def test_word2vec_smaller_vocab_than_glove(self):
        wc = M.load(M.MODELS["WC"])
        ge = M.load(M.MODELS["GE"])
        assert len(wc.vocab_index) < len(ge.vocab_index)

    def test_static_not_normalized(self):
        out = M.embed_batch(M.MODELS["GE"], ["sony camera"])
        assert abs(np.linalg.norm(out[0]) - 1.0) > 1e-3


class TestFamilyBehaviour:
    """The mechanistic signatures the reproduction rests on."""

    def _gap(self, code):
        a = ["sony dcr hc21 digital camcorder zoom",
             "query optimization distributed databases john smith"]
        b = ["sony dcrhc21 digital camcorder zom",
             "query optimizaton distributed databases j smith"]
        c = ["belkin wireless router adapter",
             "neural entity matching transformers mary jones"]
        va = M.embed_batch(M.MODELS[code], a)
        vb = M.embed_batch(M.MODELS[code], b)
        vc = M.embed_batch(M.MODELS[code], c)
        sim = lambda x, y: float(np.mean(1 / (1 + np.linalg.norm(x - y, axis=1))))
        return sim(va, vb) - sim(va, vc)

    def test_sbert_discriminative(self):
        for code in SBERT:
            assert self._gap(code) > 0.05, code

    def test_albert_xlnet_poorly_discriminative(self):
        """AT/XT separate matches from non-matches far worse than S-GTR-T5."""
        g5 = self._gap("S5")
        assert self._gap("AT") < 0.5 * g5
        assert self._gap("XT") < 0.5 * g5

    def test_distilbert_best_bert(self):
        assert self._gap("DT") >= self._gap("BT") - 0.02
        assert self._gap("DT") >= self._gap("AT")
        assert self._gap("DT") >= self._gap("XT")

    def test_finetuning_fixes_bert(self):
        """The paper's supervised reversal: fine-tuned BERT models become
        discriminative."""
        a = ["sony dcr hc21 digital camcorder zoom"]
        b = ["sony dcrhc21 digital camcorder zom"]
        c = ["belkin wireless router adapter"]
        for code in ("BT", "AT", "RA", "XT"):
            ft = M.MODELS[code].finetuned()
            va, vb, vc = (M.embed_batch(ft, x) for x in (a, b, c))
            d_match = np.linalg.norm(va - vb)
            d_non = np.linalg.norm(va - vc)
            assert d_match < d_non, code

    def test_xlnet_permutation_sensitivity(self):
        """XT's PLM permutation keys on the exact surface: one-char change
        reshuffles the contextual stack input."""
        spec = M.MODELS["XT"]
        assert spec.permute

    def test_albert_shares_weights(self):
        st = M.load(M.MODELS["AT"])
        W0, W1 = st.attn[0][0], st.attn[1][0]
        np.testing.assert_array_equal(W0, W1)

    def test_bert_layers_differ(self):
        st = M.load(M.MODELS["BT"])
        assert not np.allclose(st.attn[0][0], st.attn[1][0])


class TestState:
    def test_state_cache_keyed_by_spec(self):
        from dataclasses import replace

        a = M.load(M.MODELS["BT"])
        b = M.load(replace(M.MODELS["BT"], sent_noise=0.99))
        assert a is not b

    def test_fasttext_bucket_table(self):
        st = M.load(M.MODELS["FT"])
        assert st.buckets.shape == (2 ** 16, 300)

    def test_embedder_callable(self):
        f = M.embedder(M.MODELS["SM"])
        assert f(["a b"]).shape == (1, 384)
