"""Blocking: top-k nearest-neighbour search over embedding vectors.

Clean-Clean ER uses **exact** NNS, as in the paper: every entity of the
smaller source queries against the full vector set of the other source.
The index side is collected and broadcast (the paper's datasets top out at
~62K × 768 floats ≈ 180 MB); queries stream through ``mapInPandas`` computing
chunked Euclidean top-k — the |V1|×|V2| distance matrix never materialises.

Approximate NNS for the large Dirty-ER datasets lives in ``repro.ann.ivf``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import (
    DoubleType,
    IntegerType,
    LongType,
    StructField,
    StructType,
)

PAIR_SCHEMA = StructType([
    StructField("qid", LongType()),
    StructField("iid", LongType()),
    StructField("dist", DoubleType()),
    StructField("rank", IntegerType()),
])


def _topk_block(Q: np.ndarray, I: np.ndarray, k: int,
                qids: np.ndarray, iids: np.ndarray,
                exclude_self: bool) -> pd.DataFrame:
    """Exact Euclidean top-k of each row of Q against I (both float32)."""
    # squared distances via the expanded form; chunk callers keep this small
    d2 = (
        (Q * Q).sum(axis=1, keepdims=True)
        - 2.0 * (Q @ I.T)
        + (I * I).sum(axis=1)[None, :]
    )
    if exclude_self:
        same = qids[:, None] == iids[None, :]
        d2[same] = np.inf
    n = d2.shape[1]
    # preselect with slack, then order by (dist, iid) so ties at the k-th
    # place resolve identically regardless of index row order
    kk = min(k + 32, n)
    part = np.argpartition(d2, kk - 1, axis=1)[:, :kk] if kk < n \
        else np.broadcast_to(np.arange(n), (Q.shape[0], n))
    rows = np.repeat(np.arange(Q.shape[0]), part.shape[1])
    cols = part.ravel()
    dd = np.sqrt(np.maximum(d2[rows, cols], 0.0))
    out = pd.DataFrame({
        "qid": qids[rows],
        "iid": iids[cols],
        "dist": np.round(dd, 5),  # float32 jitter must not reorder ties
    })
    out = out.sort_values(["qid", "dist", "iid"], kind="mergesort")
    out["rank"] = out.groupby("qid").cumcount().astype("int32") + 1
    return out[out["rank"] <= k]


def topk_pairs(spark: SparkSession, queries: DataFrame, index: DataFrame,
               k: int, *, id_col: str = "id", emb_col: str = "embedding",
               exclude_self: bool = False, chunk: int = 256) -> DataFrame:
    """Exact top-``k`` candidate pairs: DF(qid, iid, dist, rank).

    ``queries``/``index`` need ``id_col`` + ``emb_col``. ``exclude_self``
    drops qid==iid hits (Dirty ER, where an entity must not match itself).
    """
    idx_pd = index.select(id_col, emb_col).toPandas()
    iids = idx_pd[id_col].to_numpy(dtype=np.int64)
    I = np.stack(idx_pd[emb_col].to_numpy()).astype(np.float32)
    bc = spark.sparkContext.broadcast((iids, I))

    def fn(batches):
        b_iids, b_I = bc.value
        for pdf in batches:
            if pdf.empty:
                continue
            qids = pdf[id_col].to_numpy(dtype=np.int64)
            Q = np.stack(pdf[emb_col].to_numpy()).astype(np.float32)
            for s in range(0, len(pdf), chunk):
                e = min(s + chunk, len(pdf))
                yield _topk_block(Q[s:e], b_I, k, qids[s:e], b_iids,
                                  exclude_self)

    return queries.select(id_col, emb_col).mapInPandas(fn, PAIR_SCHEMA)


def dedup_pairs(cands: DataFrame) -> DataFrame:
    """Canonicalize Dirty-ER candidates: order ids, drop the redundant
    reverse pair ⟨e_j, e_i⟩ (counted once, as in the paper §5.1.1)."""
    from pyspark.sql import functions as F

    return (
        cands.select(
            F.least("qid", "iid").alias("id1"),
            F.greatest("qid", "iid").alias("id2"),
        )
        .distinct()
    )
