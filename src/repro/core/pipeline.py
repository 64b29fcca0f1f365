"""The paper's end-to-end, learning-free ER pipeline (Fig. 1 / §5.2 SotA).

Vectorize with the best model (S-GTR-T5 by default) → blocking with exact
NNS, k=10 candidates per entity of the smaller source → sim = 1/(1+dist) →
UMC with the *default* threshold δ=0.5 (no tuning, no labels).

Returns both effectiveness (P/R/F1 against the ground truth) and the paper's
timing split: preprocessing time t_p (vectorization + indexing + querying)
and matching time t_m (UMC only).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import clustering
from repro.core.matching import candidate_pairs
from repro.core.metrics import prf
from repro.core.models import MODELS, ModelSpec


@dataclass
class EndToEndResult:
    model: str
    dataset: str
    precision: float
    recall: float
    f1: float
    t_preprocess: float  # vectorize + NNS (s)
    t_match: float       # UMC (s)
    matches: pd.DataFrame


def end_to_end(spark: SparkSession, df1: DataFrame, df2: DataFrame,
               gt: DataFrame, *, spec: ModelSpec | None = None, k: int = 10,
               delta: float = 0.5, dataset: str = "") -> EndToEndResult:
    """Run the parameter-free pipeline; S-GTR-T5, k=10, δ=0.5 by default."""
    spec = spec or MODELS["S5"]
    pairs, n_left, t_vec, t_cand = candidate_pairs(
        spark, df1, df2, spec, k_cand=k)

    t0 = time.perf_counter()
    matches = clustering.umc(pairs, n_left=n_left, delta=delta)
    t_match = time.perf_counter() - t0

    gt_set = set(zip(*(gt.toPandas()[c] for c in ("id1", "id2"))))
    hits = sum((a, b) in gt_set
               for a, b in zip(matches["id1"], matches["id2"]))
    p, r, f = prf(len(matches), len(gt_set), hits)
    return EndToEndResult(model=spec.code, dataset=dataset, precision=p,
                          recall=r, f1=f, t_preprocess=t_vec + t_cand,
                          t_match=t_match, matches=matches)
