"""Shape tests: the paper's headline findings must hold on the reproduction.

These read the memoized evaluation cache when the jobs have already run
(results/eval_cache.json) and compute the needed cells otherwise, so the
suite is self-contained but cheap after a full harness run.
"""
import json
import os

import numpy as np
import pytest

from repro import harness as H

_CELLS = [("D2", m) for m in H.ALL_MODELS] + [("D4", m) for m in H.ALL_MODELS]


@pytest.fixture(scope="module")
def results(spark):
    path = H._cache_path("eval_cache.json")
    store = json.load(open(path)) if os.path.exists(path) else {}
    out = {}
    for ds, m in _CELLS:
        key = f"{ds}:{m}"
        if key not in store:
            store[key] = H.evaluate(spark, ds, m, k_cand=50)
            json.dump(store, open(path, "w"), indent=1)
        out[(ds, m)] = store[key]
    return out


def _family_mean(results, ds, fam, field):
    from repro.core.models import MODELS

    vals = [results[(ds, m)][field] for m in H.ALL_MODELS
            if MODELS[m].family == fam]
    return float(np.mean(vals))


class TestBlockingShapes:
    """Fig. 3/4: SentenceBERT > static > BERT; AT/XT worst; DT best BERT."""

    @pytest.mark.parametrize("ds", ["D2"])
    def test_family_ordering_hard_dataset(self, results, ds):
        sb = _family_mean(results, ds, "sbert", "recall@10")
        st = _family_mean(results, ds, "static", "recall@10")
        bt = _family_mean(results, ds, "bert", "recall@10")
        assert sb > st > bt

    @pytest.mark.parametrize("ds", ["D2", "D4"])
    def test_sbert_never_bad(self, results, ds):
        for m in ("ST", "S5", "SA", "SM"):
            assert results[(ds, m)]["recall@10"] > 0.85

    @pytest.mark.parametrize("ds", ["D2", "D4"])
    def test_albert_xlnet_worst(self, results, ds):
        worst_two = sorted(H.ALL_MODELS,
                           key=lambda m: results[(ds, m)]["recall@10"])[:2]
        assert set(worst_two) == {"AT", "XT"}

    def test_distilbert_best_bert(self, results):
        berts = ["BT", "AT", "RA", "DT", "XT"]
        best = max(berts, key=lambda m: results[("D2", m)]["recall@10"])
        assert best == "DT"

    def test_d4_easy_for_trained_models(self, results):
        for m in ("GE", "FT", "WC", "ST", "S5", "SA", "SM", "BT", "RA", "DT"):
            assert results[("D4", m)]["recall@10"] > 0.95


class TestUnsupervisedShapes:
    """Fig. 8: same family ordering by best F1; D4 easy except AT/XT."""

    def test_family_ordering_f1(self, results):
        sb = _family_mean(results, "D2", "sbert", "f1")
        st = _family_mean(results, "D2", "static", "f1")
        bt = _family_mean(results, "D2", "bert", "f1")
        assert sb > st > bt

    def test_albert_xlnet_f1_collapse(self, results):
        for m in ("AT", "XT"):
            assert results[("D2", m)]["f1"] < 0.37  # paper: never above 0.37

    def test_bert_ok_on_clean_d4(self, results):
        for m in ("BT", "RA", "DT"):
            assert results[("D4", m)]["f1"] > 0.9  # paper: ~0.9 on D4

    def test_s5_best_or_near_best(self, results):
        f1s = {m: results[("D2", m)]["f1"] for m in H.ALL_MODELS}
        assert f1s["S5"] >= max(f1s.values()) - 0.05

    def test_umc_time_small(self, results):
        """Paper §6.3: matching time well under a second on these sizes."""
        assert results[("D2", "S5")]["t_umc"] < 2.0


class TestVectorizationShapes:
    """Table 4: static transform fast / init slow; SM fastest dynamic,
    GloVe fastest overall transform."""

    def test_glove_transform_fastest_family(self, results):
        ge = results[("D4", "GE")]["t_vectorize"]
        for m in ("BT", "XT", "S5"):
            assert ge <= results[("D4", m)]["t_vectorize"] * 1.5

    def test_static_init_dominates_dynamic(self, results):
        ft = results[("D4", "FT")]["t_init"]
        dyn = [results[("D4", m)]["t_init"] for m in ("BT", "DT", "SM")]
        assert ft > max(dyn)
