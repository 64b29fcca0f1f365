"""Experiment harness: one evaluation pass per (dataset, model), projected
into the paper's tables.

``evaluate`` runs the full unsupervised pipeline for one model on one
Clean-Clean dataset and returns every measurement the paper's tables and
figures need (init / vectorization / NNS / UMC times, recall@k, best-F1
sweep). ``evaluate_all`` memoizes results in a JSON cache so the per-table
jobs and benchmarks share one run.

Tables (see DESIGN.md §4): 1 (model registry), 2a/2b (dataset stats),
3 (DSM stats), 4 (vectorization times), 5a (DeepBlocker vs S-GTR-T5),
5b (ZeroER vs S-GTR-T5), 6 (supervised times) — plus the figure-shaped
effectiveness summaries (blocking recall, unsupervised F1, scalability).
"""
from __future__ import annotations

import json
import os
import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core import clustering
from repro.core.matching import candidate_pairs
from repro.core.models import MODELS, SUPERVISED_MODELS
from repro.core.vectorize import init_model
from repro.data import dsm as dsm_mod
from repro.data import febrl as febrl_mod
from repro.data.er_datasets import DATASETS, generate

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "..", "results")

ALL_MODELS = list(MODELS)
ALL_DATASETS = list(DATASETS)


def _cache_path(name: str) -> str:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    return os.path.join(RESULTS_DIR, name)


def evaluate(spark: SparkSession, ds: str, code: str, *, k_cand: int = 200,
             seed: int = 0) -> dict:
    """Full unsupervised evaluation of one model on one dataset."""
    spec = MODELS[code]
    t_init = init_model(spec)
    df1, df2, gt = generate(spark, ds)
    pairs, n_left, t_vec, t_cand = candidate_pairs(
        spark, df1, df2, spec, k_cand=k_cand)
    gt_pd = gt.toPandas()
    gt_set = set(zip(gt_pd["id1"], gt_pd["id2"]))

    # recall@k from the ranked candidate list (Fig. 3 rows k ∈ {1,5,10});
    # rank per *query* entity — the smaller source, as in the paper
    qcol = "id1" if DATASETS[ds].n1 <= DATASETS[ds].n2 else "id2"
    pr = pairs.sort_values("sim", ascending=False, kind="mergesort")
    pr = pr.assign(rank=pr.groupby(qcol).cumcount() + 1)
    rec = {}
    for k in (1, 5, 10):
        top = pr[pr["rank"] <= k]
        rec[f"recall@{k}"] = (
            sum((a, b) in gt_set for a, b in zip(top["id1"], top["id2"]))
            / max(len(gt_set), 1))

    t0 = time.perf_counter()
    matches = clustering.umc(pairs, n_left=n_left)
    t_umc = time.perf_counter() - t0
    sw = clustering.sweep(matches, gt_pd)
    best = sw.loc[sw["f1"].idxmax()]
    return {
        "dataset": ds, "model": code,
        "t_init": t_init, "t_vectorize": t_vec, "t_nns": t_cand,
        "t_umc": t_umc,
        **rec,
        "best_delta": float(best["delta"]), "precision": float(best["precision"]),
        "recall": float(best["recall"]), "f1": float(best["f1"]),
    }


def evaluate_all(spark: SparkSession, *, datasets=None, models=None,
                 cache: str = "eval_cache.json", k_cand: int = 200,
                 verbose: bool = True) -> pd.DataFrame:
    """Memoized sweep over datasets × models (the expensive pass)."""
    datasets = datasets or ALL_DATASETS
    models = models or ALL_MODELS
    path = _cache_path(cache)
    store: dict[str, dict] = {}
    if os.path.exists(path):
        store = json.load(open(path))
    for ds in datasets:
        for code in models:
            key = f"{ds}:{code}"
            if key in store:
                continue
            store[key] = evaluate(spark, ds, code, k_cand=k_cand)
            json.dump(store, open(path, "w"), indent=1)
            if verbose:
                r = store[key]
                print(f"[eval] {key}: R@10={r['recall@10']:.3f} "
                      f"F1={r['f1']:.3f} t_vec={r['t_vectorize']:.1f}s",
                      flush=True)
    rows = [store[f"{ds}:{c}"] for ds in datasets for c in models
            if f"{ds}:{c}" in store]
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------------
# Table projections.
# ---------------------------------------------------------------------------


def table1() -> pd.DataFrame:
    """Model registry (paper Table 1)."""
    return pd.DataFrame([
        {"code": s.code, "model": s.name, "family": s.family, "dim": s.dim,
         "max_seq": s.max_seq or "-", "params_M": s.params_m or "-"}
        for s in MODELS.values()
    ])


def table2a(stats_only: bool = True) -> pd.DataFrame:
    """Clean-Clean dataset characteristics (paper Table 2a), measured on the
    generated data."""
    from repro.data.er_datasets import generate_pandas

    rows = []
    for name, spec in DATASETS.items():
        p1, p2, gt = generate_pandas(name)

        def slen(df):
            s = (df.drop(columns=["id"]).astype(str).agg(" ".join, axis=1)
                 .str.replace(r"\s+", " ", regex=True).str.strip())
            return float(s.str.len().mean())

        rows.append({
            "dataset": name, "V1": len(p1), "V2": len(p2),
            "A1": spec.attrs1, "A2": spec.attrs2, "D": len(gt),
            "avg_len": round(0.5 * (slen(p1) + slen(p2)), 2),
            "paper_avg_len": spec.paper_avg_len,
        })
    return pd.DataFrame(rows)


#: Paper Table 2(b): size → reported duplicate-pair count.
TABLE2B_PAPER = {10_000: 8_705, 50_000: 43_071, 100_000: 85_497,
                 200_000: 172_403, 300_000: 257_034,
                 1_000_000: 857_538, 2_000_000: 1_716_102}


def table2b(sizes=(10_000, 50_000, 100_000)) -> pd.DataFrame:
    """Dirty-ER dataset characteristics (paper Table 2b)."""
    rows = []
    for n in sizes:
        df, gt = febrl_mod.generate_pandas(n, seed=0)
        s = (df[febrl_mod.ATTRS].astype(str).agg(" ".join, axis=1)
             .str.replace(r"\s+", " ", regex=True).str.strip())
        rows.append({
            "n": n, "D_pairs": len(gt),
            "paper_D_pairs": TABLE2B_PAPER.get(n, None),
            "avg_len": round(float(s.str.len().mean()), 2),
            "paper_avg_len": 84.3,
            "matched_frac": round(float((df["cluster"] >= 0).mean()), 3),
        })
    return pd.DataFrame(rows)


def table3() -> pd.DataFrame:
    """Supervised-matching dataset characteristics (paper Table 3)."""
    rows = []
    for name, s in dsm_mod.DSM.items():
        df = dsm_mod.generate_pandas(name)
        rows.append({
            "dataset": name, "total_pairs": len(df),
            "test_pairs": int((df["split"] == "test").sum()),
            "duplicates": int(df["label"].sum()), "attrs": s.attrs,
            "paper_pairs": s.total_pairs, "paper_dups": s.duplicates,
        })
    return pd.DataFrame(rows)


def table4(results: pd.DataFrame) -> pd.DataFrame:
    """Vectorization times (paper Table 4): one Init row + per-dataset rows,
    models as columns."""
    init = results.groupby("model")["t_init"].max()
    piv = results.pivot_table(index="dataset", columns="model",
                              values="t_vectorize")
    piv = piv.reindex(index=[d for d in ALL_DATASETS if d in piv.index],
                      columns=[m for m in ALL_MODELS if m in piv.columns])
    out = pd.concat([init.to_frame().T.rename(index={"t_init": "Init"})
                     .reindex(columns=piv.columns), piv])
    return out.round(2)


def fig3_blocking_recall(results: pd.DataFrame) -> pd.DataFrame:
    """Blocking recall per model/dataset for k ∈ {1,5,10} (Fig. 3)."""
    rows = []
    for _, r in results.iterrows():
        for k in (1, 5, 10):
            rows.append({"dataset": r["dataset"], "model": r["model"],
                         "k": k, "recall": round(r[f"recall@{k}"], 3)})
    return pd.DataFrame(rows)


def fig8_unsup(results: pd.DataFrame) -> pd.DataFrame:
    """Unsupervised matching best-F1 per model/dataset (Fig. 8)."""
    cols = ["dataset", "model", "best_delta", "precision", "recall", "f1",
            "t_umc"]
    return results[cols].round(3)


def table5a(spark: SparkSession, *, datasets=None, ks=(1, 5, 10),
            cache: str = "table5a.json", seed: int = 0) -> pd.DataFrame:
    """Blocking time: DeepBlocker vs S-GTR-T5 (paper Table 5a), plus their
    recall@k so the Fig. 3 'SotA' column falls out of the same run."""
    from repro.baselines import deepblocker
    from repro.core.matching import candidate_pairs as cp

    datasets = datasets or ALL_DATASETS
    path = _cache_path(cache)
    store = json.load(open(path)) if os.path.exists(path) else {}
    for ds in datasets:
        for k in ks:
            key = f"{ds}:{k}"
            if key in store:
                continue
            df1, df2, gt = generate(spark, ds)
            gt_pd = gt.toPandas()
            gt_set = set(zip(gt_pd["id1"], gt_pd["id2"]))

            def rec_of(cand: pd.DataFrame) -> float:
                lo = cand[["qid", "iid"]].min(axis=1)
                hi = cand[["qid", "iid"]].max(axis=1)
                return (sum((a, b) in gt_set for a, b in zip(lo, hi))
                        / max(len(gt_set), 1))

            db = deepblocker.block(spark, df1, df2, k, seed=seed)
            t0 = time.perf_counter()
            pairs, n_left, t_vec, t_cand = cp(spark, df1, df2, MODELS["S5"],
                                              k_cand=k)
            t_s5 = time.perf_counter() - t0
            s5_cand = pairs.rename(columns={"id1": "qid", "id2": "iid"})
            store[key] = {
                "dataset": ds, "k": k,
                "deepblocker_s": round(db.t_total, 2),
                "s_gtr_t5_s": round(t_s5, 2),
                "deepblocker_recall": round(rec_of(db.cands), 3),
                "s_gtr_t5_recall": round(rec_of(s5_cand), 3),
            }
            json.dump(store, open(path, "w"), indent=1)
            print(f"[5a] {key}: {store[key]}", flush=True)
    return pd.DataFrame([store[f"{ds}:{k}"] for ds in datasets for k in ks
                         if f"{ds}:{k}" in store])


def table5b(spark: SparkSession, *, datasets=None,
            cache: str = "table5b.json", seed: int = 0) -> pd.DataFrame:
    """Unsupervised-matching SotA: ZeroER vs end-to-end S-GTR-T5 (Table 5b +
    Fig. 8d effectiveness)."""
    from repro.baselines import zeroer
    from repro.core.pipeline import end_to_end

    datasets = datasets or ALL_DATASETS
    path = _cache_path(cache)
    store = json.load(open(path)) if os.path.exists(path) else {}
    for ds in datasets:
        if ds in store:
            continue
        df1, df2, gt = generate(spark, ds)
        z = zeroer.run(spark, df1, df2, gt, seed=seed)
        e = end_to_end(spark, df1, df2, gt, dataset=ds)
        store[ds] = {
            "dataset": ds,
            "zeroer_tp_s": round(z.t_preprocess, 2),
            "zeroer_tm_s": round(z.t_match, 3),
            "zeroer_f1": round(z.f1, 3),
            "s5_tp_s": round(e.t_preprocess, 2),
            "s5_tm_ms": round(e.t_match * 1000, 1),
            "s5_f1": round(e.f1, 3),
        }
        json.dump(store, open(path, "w"), indent=1)
        print(f"[5b] {ds}: {store[ds]}", flush=True)
    return pd.DataFrame([store[ds] for ds in datasets if ds in store])


def table6(*, datasets=None, models=None, sample: float = 1.0,
           cache: str = "table6.json", epochs: int = 10) -> pd.DataFrame:
    """Supervised matching: F1 + train/test times (Table 6 + Fig. 11)."""
    from repro.core.supervised import train_eval

    datasets = datasets or list(dsm_mod.DSM)
    models = models or SUPERVISED_MODELS
    path = _cache_path(cache)
    store = json.load(open(path)) if os.path.exists(path) else {}
    for ds in datasets:
        data = None
        for code in models:
            key = f"{ds}:{code}:{sample}"
            if key in store:
                continue
            if data is None:
                data = dsm_mod.generate_pandas(ds)
            r = train_eval(ds, code, data=data, sample=sample, epochs=epochs)
            store[key] = {"dataset": ds, "model": code, "f1": round(r.f1, 3),
                          "t_train_s": round(r.t_train, 1),
                          "t_test_s": round(r.t_test, 2)}
            json.dump(store, open(path, "w"), indent=1)
            print(f"[t6] {key}: {store[key]}", flush=True)
    return pd.DataFrame([store[f"{ds}:{c}:{sample}"] for ds in datasets
                         for c in models if f"{ds}:{c}:{sample}" in store])


def fig7_scalability(spark: SparkSession, *, sizes=(10_000, 50_000, 100_000),
                     models=None, k: int = 10, nprobe: int = 8,
                     cache: str = "fig7.json") -> pd.DataFrame:
    """Dirty-ER blocking scalability with the IVF ANN index (Fig. 7/13)."""
    from repro.ann.ivf import IVFIndex
    from repro.core.blocking import dedup_pairs
    from repro.core.metrics import pair_precision, pair_recall
    from repro.core.tokenize import with_sentence
    from repro.core.vectorize import vectorize

    models = models or ALL_MODELS
    path = _cache_path(cache)
    store = json.load(open(path)) if os.path.exists(path) else {}
    for n in sizes:
        df, gt = None, None
        for code in models:
            key = f"{n}:{code}"
            if key in store:
                continue
            if df is None:
                df, gt = febrl_mod.generate(spark, n, seed=0)
                df = df.drop("cluster").cache()
                gt = gt.cache()
            spec = MODELS[code]
            t0 = time.perf_counter()
            v = (vectorize(with_sentence(df), spec)
                 .select("id", "embedding").cache())
            v.count()
            t_vec = time.perf_counter() - t0
            t0 = time.perf_counter()
            ix = IVFIndex.build(spark, v, seed=0)
            cand = ix.search(v, k, nprobe=nprobe, exclude_self=True)
            pairs = dedup_pairs(cand).cache()
            pairs.count()
            t_block = time.perf_counter() - t0
            store[key] = {
                "n": n, "model": code,
                "recall": round(pair_recall(pairs, gt, c1="id1", c2="id2"), 3),
                "precision": round(pair_precision(pairs, gt, c1="id1", c2="id2"), 4),
                "t_vectorize_s": round(t_vec, 1),
                "t_block_s": round(t_block, 1),
            }
            v.unpersist()
            pairs.unpersist()
            ix.assigned.unpersist()
            json.dump(store, open(path, "w"), indent=1)
            print(f"[fig7] {key}: {store[key]}", flush=True)
        if df is not None:
            df.unpersist()
            gt.unpersist()
    return pd.DataFrame([store[f"{n}:{c}"] for n in sizes for c in models
                         if f"{n}:{c}" in store])
