"""Distributed IVF-Flat approximate nearest-neighbour search.

Substitute for the paper's FAISS(HNSW) index (see DESIGN.md §2): HNSW's
pointer-chasing graph does not map onto a dataflow engine, but IVF — the
other standard FAISS index family — does, and exposes the same
recall/latency trade-off behind the same ``build``/``search`` interface:

* **build**: sample vectors to the driver, run a few k-means iterations for
  ``n_centroids`` coarse centroids, then assign every vector to its nearest
  centroid with a ``mapInPandas`` pass (the "inverted lists" are simply the
  assigned DataFrame, bucketed by ``centroid``).
* **search**: each query probes its ``nprobe`` nearest centroids; a cogrouped
  ``applyInPandas`` computes exact local top-k per bucket; a window takes the
  global top-k per query.

Indexing cost grows superlinearly with input size (assignment + shuffle of
ever-larger buckets), querying stays cheap — the same asymmetry the paper
reports for HNSW (§6.2.1).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import IntegerType, StructField, StructType
from pyspark.sql.window import Window

from repro.core.blocking import PAIR_SCHEMA, _topk_block


def _kmeans(X: np.ndarray, k: int, iters: int, seed: int) -> np.ndarray:
    g = np.random.default_rng(seed)
    C = X[g.choice(len(X), size=min(k, len(X)), replace=False)].copy()
    for _ in range(iters):
        d2 = ((X * X).sum(1, keepdims=True) - 2 * X @ C.T
              + (C * C).sum(1)[None, :])
        a = d2.argmin(1)
        for j in range(len(C)):
            m = a == j
            if m.any():
                C[j] = X[m].mean(0)
    return C


def _assign(df: DataFrame, centroids_bc, *, emb_col: str,
            out_col: str) -> DataFrame:
    schema = StructType(list(df.schema.fields)
                        + [StructField(out_col, IntegerType())])

    def fn(batches):
        C = centroids_bc.value
        for pdf in batches:
            if pdf.empty:
                continue
            X = np.stack(pdf[emb_col].to_numpy()).astype(np.float32)
            d2 = ((X * X).sum(1, keepdims=True) - 2 * X @ C.T
                  + (C * C).sum(1)[None, :])
            pdf = pdf.copy()
            pdf[out_col] = d2.argmin(1).astype("int32")
            yield pdf

    return df.mapInPandas(fn, schema)


class IVFIndex:
    """Coarse-quantized vector index as a Spark DataFrame."""

    def __init__(self, spark: SparkSession, assigned: DataFrame,
                 centroids: np.ndarray, id_col: str, emb_col: str):
        self.spark = spark
        self.assigned = assigned
        self.centroids = centroids
        self.id_col = id_col
        self.emb_col = emb_col

    @classmethod
    def build(cls, spark: SparkSession, df: DataFrame, *,
              n_centroids: int | None = None, id_col: str = "id",
              emb_col: str = "embedding", sample: int = 20_000,
              iters: int = 6, seed: int = 0) -> "IVFIndex":
        n = df.count()
        if n_centroids is None:
            n_centroids = max(4, int(np.sqrt(n)))
        frac = min(1.0, sample / max(n, 1))
        samp = df.select(emb_col).sample(frac, seed=seed).toPandas()
        X = np.stack(samp[emb_col].to_numpy()).astype(np.float32)
        C = _kmeans(X, n_centroids, iters, seed)
        bc = spark.sparkContext.broadcast(C)
        assigned = (_assign(df.select(id_col, emb_col), bc,
                            emb_col=emb_col, out_col="centroid")
                    .repartition("centroid")
                    .cache())
        assigned.count()  # materialize: index build cost lands here
        return cls(spark, assigned, C, id_col, emb_col)

    def search(self, queries: DataFrame, k: int, *, nprobe: int = 8,
               exclude_self: bool = False) -> DataFrame:
        """Top-k per query over the ``nprobe`` nearest buckets."""
        C = self.centroids
        nprobe = min(nprobe, len(C))
        bc = self.spark.sparkContext.broadcast(C)
        probe_schema = StructType([
            StructField("qid", PAIR_SCHEMA["qid"].dataType, False),
            StructField("centroid", IntegerType()),
        ] )

        id_col, emb_col = self.id_col, self.emb_col

        def probes(batches):
            CC = bc.value
            for pdf in batches:
                if pdf.empty:
                    continue
                X = np.stack(pdf[emb_col].to_numpy()).astype(np.float32)
                d2 = ((X * X).sum(1, keepdims=True) - 2 * X @ CC.T
                      + (CC * CC).sum(1)[None, :])
                near = np.argpartition(d2, nprobe - 1, 1)[:, :nprobe]
                yield pd.DataFrame({
                    "qid": np.repeat(pdf[id_col].to_numpy(), nprobe),
                    "centroid": near.ravel().astype("int32"),
                })

        q = queries.select(id_col, emb_col).cache()
        probe_df = q.mapInPandas(probes, probe_schema)
        q_probe = probe_df.join(
            q.withColumnRenamed(id_col, "qid"), "qid")

        def local_topk(qpdf: pd.DataFrame, ipdf: pd.DataFrame) -> pd.DataFrame:
            if qpdf.empty or ipdf.empty:
                return pd.DataFrame(columns=["qid", "iid", "dist", "rank"])
            Q = np.stack(qpdf[emb_col].to_numpy()).astype(np.float32)
            I = np.stack(ipdf[emb_col].to_numpy()).astype(np.float32)
            out = _topk_block(
                Q, I, k,
                qpdf["qid"].to_numpy(dtype=np.int64),
                ipdf[id_col].to_numpy(dtype=np.int64),
                exclude_self,
            )
            return out

        local = (
            q_probe.groupBy("centroid")
            .cogroup(self.assigned.groupBy("centroid"))
            .applyInPandas(lambda qp, ip: local_topk(qp, ip), PAIR_SCHEMA)
        )
        w = Window.partitionBy("qid").orderBy(F.col("dist").asc(),
                                              F.col("iid").asc())
        out = (local.withColumn("rank", F.row_number().over(w))
               .where(F.col("rank") <= k))
        q.unpersist()
        return out
