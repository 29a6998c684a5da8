"""Graph Laplacian machinery for DB alignment (paper §4.2).

Builds the similarity weights ``w_ij = exp(-|x_i - x_j|^2 / 2 sigma^2)`` over
kNN edges, the degree matrix D, and the DB-alignment matrix
``M_D = X^T (D - W) X`` — a (d, d) matrix whose size is independent of the
database, which is the whole point: at query time only ``w^T M_D w`` is
evaluated.

Substitutions vs the paper (DESIGN.md §2): sigma is expressed *relative to
the median kNN distance* of the dataset (the paper's absolute sigma = .05 is
specific to CLIP-space distances), and ``M_D`` is normalized by the number
of vectors N so the paper's lambda_D magnitude transfers across scales.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graph.knn import knn_graph_np


def edge_weights(dists: np.ndarray, *, sigma_rel: float = 1.0) -> tuple[np.ndarray, float]:
    """Similarity weights for kNN edge distances.

    ``sigma = sigma_rel * median(dists)``; returns ``(weights, sigma)``.
    """
    med = float(np.median(dists))
    sigma = max(sigma_rel * med, 1e-9)
    w = np.exp(-(dists.astype(np.float64) ** 2) / (2.0 * sigma**2))
    return w, sigma


def _sym_coo(idx: np.ndarray, w: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Directed kNN edges -> symmetric COO (i, j, w_sym) with W_sym=(W+W^T)/2."""
    n, k = idx.shape
    src = np.repeat(np.arange(n, dtype=np.int64), k)
    dst = idx.ravel().astype(np.int64)
    ww = w.ravel().astype(np.float64) / 2.0
    i = np.concatenate([src, dst])
    j = np.concatenate([dst, src])
    vv = np.concatenate([ww, ww])
    return i, j, vv


def m_matrix_np(
    X: np.ndarray, idx: np.ndarray, w: np.ndarray, *, normalize: bool = True
) -> np.ndarray:
    """``M_D = X^T (D - W_sym) X`` (optionally divided by N). Symmetric PSD."""
    X = np.asarray(X, dtype=np.float64)
    n, d = X.shape
    i, j, vv = _sym_coo(idx, w)
    deg = np.bincount(i, weights=vv, minlength=n)
    # (W X)_i = sum_j w_ij x_j via scatter-add over edges.
    WX = np.zeros((n, d))
    np.add.at(WX, i, vv[:, None] * X[j])
    M = X.T @ (deg[:, None] * X - WX)
    M = (M + M.T) / 2.0  # numerical symmetry
    return M / n if normalize else M


def m_matrix_spark(
    spark: SparkSession,
    X: np.ndarray,
    edges,
    *,
    normalize: bool = True,
) -> np.ndarray:
    """Spark build of ``M_D`` from an edge DataFrame ``(src, dst, dist, ...)``
    that already carries a ``weight`` column.

    Each partition of edges computes its partial
    ``sum_e w_e (x_src - x_dst)(x_src - x_dst)^T / 2`` against the broadcast
    vector matrix (this identity equals ``X^T (D - W_sym) X`` summed over
    symmetric edges); partials are (d*d)-vectors summed in the driver.
    """
    X = np.asarray(X, dtype=np.float64)
    n, d = X.shape
    bX = spark.sparkContext.broadcast(X)

    def partial(batches):
        Xl = bX.value
        acc = np.zeros((d, d))
        any_rows = False
        for pdf in batches:
            if len(pdf) == 0:
                continue
            any_rows = True
            s = pdf["src"].to_numpy()
            t = pdf["dst"].to_numpy()
            ww = pdf["weight"].to_numpy()
            diff = Xl[s] - Xl[t]
            # sum_e w_e diff diff^T ; /2 below because each undirected pair
            # appears up to twice (once per direction) in a kNN edge list —
            # matches the (W + W^T)/2 symmetrization of the numpy reference.
            acc += (diff * ww[:, None]).T @ diff
        if any_rows:
            yield pd.DataFrame({"m": [acc.ravel()]})

    from pyspark.sql import types as T

    schema = T.StructType([T.StructField("m", T.ArrayType(T.DoubleType()))])
    parts = edges.mapInPandas(partial, schema=schema).collect()
    M = np.zeros((d, d))
    for row in parts:
        M += np.asarray(row["m"]).reshape(d, d)
    M /= 2.0
    # Mutual edges (i->j and j->i both in the kNN list) were counted twice
    # (correct, each contributes w/2 * 2); single-direction edges once at
    # w/2-equivalent — identical to the numpy _sym_coo construction.
    M = (M + M.T) / 2.0
    return M / n if normalize else M


def build_db_alignment(
    X: np.ndarray, *, k: int = 10, sigma_rel: float = 1.0
) -> np.ndarray:
    """One-call preprocessing path: kNN graph -> weights -> normalized M_D."""
    idx, dist = knn_graph_np(X, k)
    w, _ = edge_weights(dist, sigma_rel=sigma_rel)
    return m_matrix_np(X, idx, w)
