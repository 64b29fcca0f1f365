"""Pair-level evaluation measures for blocking and matching.

Recall here is "pairs completeness": the fraction of ground-truth duplicate
pairs present in the candidate/matched set. Precision is the fraction of
emitted pairs that are true duplicates. All functions take Spark DataFrames
with ``id1``/``id2`` pair columns (or qid/iid candidates) and aggregate with
Catalyst joins, so they work unchanged at Dirty-ER scale.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _norm(pairs: DataFrame, c1: str, c2: str) -> DataFrame:
    return pairs.select(F.col(c1).alias("id1"), F.col(c2).alias("id2")).distinct()


def pair_recall(cands: DataFrame, gt: DataFrame, *,
                c1: str = "qid", c2: str = "iid") -> float:
    """|cands ∩ gt| / |gt| over unordered, deduplicated pairs."""
    c = _norm(cands, c1, c2)
    g = _norm(gt, "id1", "id2")
    total = g.count()
    if total == 0:
        return 0.0
    hit = c.join(g, ["id1", "id2"], "inner").count()
    return hit / total


def pair_precision(cands: DataFrame, gt: DataFrame, *,
                   c1: str = "qid", c2: str = "iid") -> float:
    c = _norm(cands, c1, c2)
    n = c.count()
    if n == 0:
        return 0.0
    hit = c.join(_norm(gt, "id1", "id2"), ["id1", "id2"], "inner").count()
    return hit / n


def prf(n_matched: int, n_true: int, n_hit: int) -> tuple[float, float, float]:
    """(precision, recall, F1) from raw counts; safe on zeros."""
    p = n_hit / n_matched if n_matched else 0.0
    r = n_hit / n_true if n_true else 0.0
    f = 2 * p * r / (p + r) if p + r else 0.0
    return p, r, f
