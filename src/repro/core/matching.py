"""Unsupervised matching: embeddings → similarity graph → UMC sweep.

The paper computes all |V1|×|V2| similarities (on GPU) and feeds them to UMC
with the similarity ``sim = 1/(1 + EuclideanDist)``. We generate candidates
with exact top-``k_cand`` NNS instead (k_cand=|V2| reproduces all-pairs on
the small datasets; k_cand=200 on the large ones — UMC at the paper's
thresholds never matches below that rank, verified in tests).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import clustering
from repro.core.blocking import topk_pairs
from repro.core.models import ModelSpec
from repro.core.tokenize import with_sentence
from repro.core.vectorize import vectorize


def similarities(dists: pd.Series | np.ndarray) -> np.ndarray:
    """The paper's similarity transform: sim = 1/(1+dist)."""
    return 1.0 / (1.0 + np.asarray(dists, dtype=np.float64))


@dataclass
class MatchResult:
    model: str
    dataset: str
    delta: float
    precision: float
    recall: float
    f1: float
    t_vectorize: float  # embed both sources (s)
    t_candidates: float  # NNS / similarity computation (s)
    t_umc: float         # UMC run (s) — the paper's "matching time"
    sweep: pd.DataFrame  # full δ-sweep
    matches: pd.DataFrame


def candidate_pairs(spark: SparkSession, df1: DataFrame, df2: DataFrame,
                    spec: ModelSpec, *, k_cand: int | None = None
                    ) -> tuple[pd.DataFrame, int, float, float]:
    """Vectorize both sources and produce candidate pairs with similarities.

    Returns (pairs[id1,id2,sim], n_left, t_vectorize, t_candidates). The
    smaller source is the query side, as in the paper.
    """
    t0 = time.perf_counter()
    v1 = vectorize(with_sentence(df1), spec).select("id", "embedding")
    v2 = vectorize(with_sentence(df2), spec).select("id", "embedding")
    v1 = v1.cache()
    v2 = v2.cache()
    n1, n2 = v1.count(), v2.count()
    t_vec = time.perf_counter() - t0

    if n1 <= n2:
        q, ix, n_left, n_right = v1, v2, n1, n2
    else:
        q, ix, n_left, n_right = v2, v1, n2, n1
    k = n_right if k_cand is None else min(k_cand, n_right)

    t0 = time.perf_counter()
    cand = topk_pairs(spark, q, ix, k).toPandas()
    t_cand = time.perf_counter() - t0
    v1.unpersist()
    v2.unpersist()

    pairs = pd.DataFrame({
        "id1": cand["qid"] if n1 <= n2 else cand["iid"],
        "id2": cand["iid"] if n1 <= n2 else cand["qid"],
        "sim": similarities(cand["dist"]),
    })
    return pairs, n_left, t_vec, t_cand


def unsupervised_match(spark: SparkSession, df1: DataFrame, df2: DataFrame,
                       gt: DataFrame, spec: ModelSpec, *, dataset: str = "",
                       k_cand: int | None = 200) -> MatchResult:
    """Full unsupervised-matching evaluation of one model on one dataset."""
    pairs, n_left, t_vec, t_cand = candidate_pairs(
        spark, df1, df2, spec, k_cand=k_cand)

    t0 = time.perf_counter()
    matches = clustering.umc(pairs, n_left=n_left)
    t_umc = time.perf_counter() - t0

    gt_pd = gt.toPandas()
    # ids in pairs follow source order (id1 from source1 via the offset)
    gt_pd = gt_pd[["id1", "id2"]]
    sw = clustering.sweep(matches, gt_pd)
    best = sw.loc[sw["f1"].idxmax()]
    return MatchResult(
        model=spec.code, dataset=dataset, delta=float(best["delta"]),
        precision=float(best["precision"]), recall=float(best["recall"]),
        f1=float(best["f1"]), t_vectorize=t_vec, t_candidates=t_cand,
        t_umc=t_umc, sweep=sw, matches=matches,
    )
