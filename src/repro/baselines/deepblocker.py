"""DeepBlocker (Auto-Encoder + FastText) — SotA deep-learning blocker.

Re-implementation of the paper's strongest DeepBlocker configuration
[Thirumuruganathan+ 2021]: FastText embeddings compressed by a
self-supervised auto-encoder, then top-k nearest-neighbour search over the
learned codes. The auto-encoder here is a tied-weight linear AE (300 → 150)
trained with minibatch Adam on a sample of the input vectors — real
self-supervised training, stochastic in its seed, exactly the property the
paper highlights (DeepBlocker is "a stochastic approach, unlike S-GTR-T5").

Timing: ``block`` reports vectorization, training and querying together, as
the paper's Table 5(a) does.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.blocking import topk_pairs
from repro.core.models import MODELS
from repro.core.tokenize import with_sentence
from repro.core.vectorize import vectorize


class AutoEncoder:
    """Tied-weight linear auto-encoder min ‖X − XWWᵀ‖² (numpy Adam)."""

    def __init__(self, d_in: int, d_code: int = 150, seed: int = 0,
                 lr: float = 1e-3):
        g = np.random.default_rng(seed)
        self.W = (g.standard_normal((d_in, d_code)) / np.sqrt(d_in)).astype(np.float32)
        self.lr = lr
        self._m = np.zeros_like(self.W)
        self._v = np.zeros_like(self.W)
        self._t = 0

    def fit(self, X: np.ndarray, *, epochs: int = 20, batch: int = 256,
            seed: int = 0) -> "AutoEncoder":
        g = np.random.default_rng(seed)
        for _ in range(epochs):
            order = g.permutation(len(X))
            for s in range(0, len(X), batch):
                xb = X[order[s: s + batch]]
                code = xb @ self.W
                rec = code @ self.W.T
                err = rec - xb                     # (B, d)
                grad = xb.T @ (err @ self.W) + err.T @ (xb @ self.W)
                grad /= len(xb)
                self._t += 1
                self._m = 0.9 * self._m + 0.1 * grad
                self._v = 0.999 * self._v + 0.001 * grad * grad
                mhat = self._m / (1 - 0.9 ** self._t)
                vhat = self._v / (1 - 0.999 ** self._t)
                self.W -= self.lr * mhat / (np.sqrt(vhat) + 1e-8)
        return self

    def encode(self, X: np.ndarray) -> np.ndarray:
        return (X @ self.W).astype(np.float32)


@dataclass
class BlockingResult:
    cands: pd.DataFrame   # qid, iid, dist, rank
    t_total: float
    t_vectorize: float
    t_train: float
    t_query: float


def block(spark: SparkSession, df1: DataFrame, df2: DataFrame, k: int, *,
          seed: int = 0, d_code: int = 150, train_sample: int = 4000
          ) -> BlockingResult:
    """Run DeepBlocker: AE(FastText) codes + exact top-k NNS.

    The smaller source is the query side, matching ``core.blocking``.
    """
    ft = MODELS["FT"]
    t0 = time.perf_counter()
    v1 = vectorize(with_sentence(df1), ft).select("id", "embedding").cache()
    v2 = vectorize(with_sentence(df2), ft).select("id", "embedding").cache()
    n1, n2 = v1.count(), v2.count()
    t_vec = time.perf_counter() - t0

    t0 = time.perf_counter()
    frac = min(1.0, train_sample / max(n1 + n2, 1))
    sample_pd = (
        v1.select("embedding").sample(frac, seed=seed)
        .union(v2.select("embedding").sample(frac, seed=seed + 1))
        .toPandas()
    )
    X = np.stack(sample_pd["embedding"].to_numpy()).astype(np.float32)
    ae = AutoEncoder(X.shape[1], d_code, seed=seed).fit(X, seed=seed)
    t_train = time.perf_counter() - t0

    t0 = time.perf_counter()
    bc = spark.sparkContext.broadcast(ae.W)

    def encode_df(df: DataFrame) -> DataFrame:
        def fn(batches):
            W = bc.value
            for pdf in batches:
                if pdf.empty:
                    continue
                Xb = np.stack(pdf["embedding"].to_numpy()).astype(np.float32)
                pdf = pdf.copy()
                pdf["embedding"] = list(Xb @ W)
                yield pdf
        return df.mapInPandas(fn, df.schema)

    e1, e2 = encode_df(v1), encode_df(v2)
    q, ix = (e1, e2) if n1 <= n2 else (e2, e1)
    cands = topk_pairs(spark, q, ix, k).toPandas()
    t_query = time.perf_counter() - t0
    v1.unpersist()
    v2.unpersist()
    return BlockingResult(cands=cands, t_total=t_vec + t_train + t_query,
                          t_vectorize=t_vec, t_train=t_train, t_query=t_query)
