"""Approximate MIP index — the Annoy stand-in (paper §2.2).

An IVF (inverted-file) index: a k-means coarse quantizer partitions the
vectors into cells at preprocessing time (a Spark job: Lloyd iterations with
assignment in pandas UDFs and centroid updates as groupBy aggregations); a
query scans only the ``nprobe`` cells whose centroids best align with it.
Like Annoy, lookups are approximate — the paper reports "only a minor drop
in accuracy" vs an exact scan, which ``tests/test_ivf.py`` verifies as a
recall@k bound here.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T


class IvfIndex:
    """IVF index over an :class:`EmbeddedDataset`'s vector DataFrame.

    ``build`` runs k-means in Spark and materializes a cell-assigned copy of
    the vector DataFrame; ``search`` scores only the vectors in the top
    ``nprobe`` cells.
    """

    def __init__(self, assigned_df: DataFrame, centroids: np.ndarray):
        self.df = assigned_df
        self.centroids = centroids

    @classmethod
    def build(
        cls,
        spark: SparkSession,
        vec_df: DataFrame,
        *,
        n_cells: int = 16,
        n_iter: int = 5,
        seed: int = 0,
    ) -> "IvfIndex":
        """K-means build. Centroid init = deterministic sample of vectors."""
        n = vec_df.count()
        if n_cells > n:
            raise ValueError(f"n_cells={n_cells} exceeds vector count {n}")
        init = (
            vec_df.orderBy(F.hash(F.col("vec_id"), F.lit(seed)))
            .limit(n_cells)
            .select("vector")
            .collect()
        )
        centroids = np.array([r["vector"] for r in init], dtype=np.float64)

        assigned = None
        for _ in range(n_iter):
            assigned = cls._assign(vec_df, centroids)
            agg = (
                assigned.select(
                    "cell", F.posexplode("vector").alias("dim", "val")
                )
                .groupBy("cell", "dim")
                .agg(F.sum("val").alias("s"), F.count("*").alias("c"))
                .groupBy("cell")
                .agg(
                    F.array_sort(
                        F.collect_list(F.struct("dim", (F.col("s") / F.col("c")).alias("m")))
                    ).alias("mean")
                )
                .collect()
            )
            for row in agg:
                centroids[row["cell"]] = [e["m"] for e in row["mean"]]
        assert assigned is not None
        return cls(cls._assign(vec_df, centroids), centroids)

    @staticmethod
    def _assign(vec_df: DataFrame, centroids: np.ndarray) -> DataFrame:
        cb = centroids.copy()

        @F.pandas_udf(T.IntegerType())
        def nearest(vectors: pd.Series) -> pd.Series:
            mat = np.stack(vectors.to_numpy())
            d2 = ((mat[:, None, :] - cb[None, :, :]) ** 2).sum(axis=2)
            return pd.Series(np.argmin(d2, axis=1).astype(np.int32))

        return vec_df.withColumn("cell", nearest(F.col("vector")))

    def search(self, q: np.ndarray, k: int, *, nprobe: int = 4) -> DataFrame:
        """Approximate top-k vectors: scan only the best ``nprobe`` cells."""
        from repro.store.scan import score_vectors

        q = np.asarray(q, dtype=np.float64)
        cell_scores = self.centroids @ q
        probe = np.argsort(-cell_scores)[:nprobe].tolist()
        cand = self.df.where(F.col("cell").isin([int(c) for c in probe]))
        return (
            score_vectors(cand, q)
            .select("vec_id", "image_id", "score")
            .orderBy(F.desc("score"), F.asc("vec_id"))
            .limit(k)
        )
