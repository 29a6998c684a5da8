"""k-nearest-neighbor graph construction.

The paper uses NN-descent (approximate) because CLIP databases are large; at
our scales an exact blocked brute-force build is affordable and removes one
source of noise, so the Spark build is exact: the vector matrix is broadcast
and each partition of query rows computes its own top-k block with numpy
(mapInPandas). ``knn_graph_np`` is the single-process reference the Spark
build is tested against.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T


def knn_graph_np(
    X: np.ndarray, k: int, *, block: int = 2048
) -> tuple[np.ndarray, np.ndarray]:
    """Exact kNN by squared Euclidean distance, excluding self.

    Returns ``(indices, dists)`` of shapes (N, k): ``indices[i]`` are the k
    nearest rows to row i (ascending distance), ``dists[i]`` the Euclidean
    distances.
    """
    X = np.asarray(X, dtype=np.float32)
    n = X.shape[0]
    if k >= n:
        raise ValueError(f"k={k} must be < n={n}")
    sq = (X * X).sum(axis=1)
    idx_out = np.empty((n, k), dtype=np.int32)
    d_out = np.empty((n, k), dtype=np.float32)
    for lo in range(0, n, block):
        hi = min(lo + block, n)
        d2 = sq[lo:hi, None] - 2.0 * (X[lo:hi] @ X.T) + sq[None, :]
        d2[np.arange(lo, hi) - lo, np.arange(lo, hi)] = np.inf  # no self-loop
        part = np.argpartition(d2, k, axis=1)[:, :k]
        pd2 = np.take_along_axis(d2, part, axis=1)
        order = np.argsort(pd2, axis=1)
        idx_out[lo:hi] = np.take_along_axis(part, order, axis=1)
        d_out[lo:hi] = np.sqrt(
            np.maximum(np.take_along_axis(pd2, order, axis=1), 0.0)
        )
    return idx_out, d_out


def knn_graph_spark(
    spark: SparkSession, X: np.ndarray, k: int, *, n_partitions: int | None = None
) -> DataFrame:
    """Exact kNN graph as a Spark edge DataFrame ``(src, dst, dist, rank)``.

    The full (N, d) float32 matrix is broadcast (tens of MB at our scales);
    each partition scores its slice of query ids against it with numpy.
    """
    X = np.asarray(X, dtype=np.float32)
    n = X.shape[0]
    if k >= n:
        raise ValueError(f"k={k} must be < n={n}")
    bX = spark.sparkContext.broadcast(X)
    n_partitions = n_partitions or spark.sparkContext.defaultParallelism
    ids = spark.range(0, n, 1, n_partitions)

    schema = T.StructType(
        [
            T.StructField("src", T.LongType()),
            T.StructField("dst", T.LongType()),
            T.StructField("dist", T.DoubleType()),
            T.StructField("rank", T.IntegerType()),
        ]
    )

    def score(batches):
        Xl = bX.value
        sq = (Xl * Xl).sum(axis=1)
        for pdf in batches:
            q = pdf["id"].to_numpy()
            if q.size == 0:
                continue
            d2 = sq[q, None] - 2.0 * (Xl[q] @ Xl.T) + sq[None, :]
            d2[np.arange(q.size), q] = np.inf
            part = np.argpartition(d2, k, axis=1)[:, :k]
            pd2 = np.take_along_axis(d2, part, axis=1)
            order = np.argsort(pd2, axis=1)
            nbr = np.take_along_axis(part, order, axis=1)
            dist = np.sqrt(np.maximum(np.take_along_axis(pd2, order, axis=1), 0.0))
            yield pd.DataFrame(
                {
                    "src": np.repeat(q, k),
                    "dst": nbr.ravel().astype(np.int64),
                    "dist": dist.ravel().astype(np.float64),
                    "rank": np.tile(np.arange(k, dtype=np.int32), q.size),
                }
            )

    return ids.mapInPandas(score, schema=schema)


def edges_to_arrays(edges_pdf: pd.DataFrame, n: int, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Convert a collected Spark edge frame back to (N, k) index/dist arrays."""
    e = edges_pdf.sort_values(["src", "rank"])
    idx = e["dst"].to_numpy().reshape(n, k).astype(np.int32)
    dist = e["dist"].to_numpy().reshape(n, k).astype(np.float32)
    return idx, dist
