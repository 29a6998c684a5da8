"""Label propagation (Zhu & Ghahramani 2002) — the conceptual starting point
of DB alignment (paper §4.2) and the "prop." column of the latency table.

``label_propagation_np`` is the single-process reference; the Spark
implementation propagates scores along the edge DataFrame with joins +
aggregation (one shuffle per iteration) — the point of Table 6 is that this
cost grows with the database size, which is exactly why SeeSaw collapses the
idea into the constant-size ``M_D`` term.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def label_propagation_np(
    idx: np.ndarray,
    w: np.ndarray,
    labeled_ids: np.ndarray,
    labels: np.ndarray,
    *,
    prior: np.ndarray | None = None,
    n_iter: int = 20,
) -> np.ndarray:
    """Propagate labels over a kNN graph; returns soft scores in [0, 1].

    Each iteration sets every node's score to the weight-normalized average
    of its neighbors' scores, then clamps labeled nodes back to their labels.
    ``prior`` (defaults to 0.5) initializes unlabeled nodes.
    """
    n, k = idx.shape
    y = np.full(n, 0.5) if prior is None else np.asarray(prior, dtype=np.float64).copy()
    labeled_ids = np.asarray(labeled_ids, dtype=np.int64)
    labels = np.asarray(labels, dtype=np.float64)
    y[labeled_ids] = labels
    wsum = w.sum(axis=1)
    wsum[wsum == 0] = 1.0
    for _ in range(n_iter):
        y = (w * y[idx]).sum(axis=1) / wsum
        y[labeled_ids] = labels
    return y


def label_propagation_spark(
    spark: SparkSession,
    edges: DataFrame,
    labeled_ids: np.ndarray,
    labels: np.ndarray,
    n_nodes: int,
    *,
    n_iter: int = 3,
) -> DataFrame:
    """Label propagation as iterated Spark joins over the edge DataFrame.

    ``edges`` must have columns ``src, dst, weight``. Returns a DataFrame
    ``(id, score)``. Deliberately the straightforward dataflow formulation —
    its per-iteration cost is one join + one groupBy over all E edges, i.e.,
    linear in database size (the scaling Table 6 demonstrates).
    """
    lab = pd.DataFrame(
        {"id": np.asarray(labeled_ids, dtype=np.int64), "label": np.asarray(labels, float)}
    )
    lab_df = spark.createDataFrame(lab) if len(lab) else None
    scores = spark.range(0, n_nodes).withColumn("score", F.lit(0.5))
    if lab_df is not None:
        scores = (
            scores.join(lab_df, "id", "left")
            .withColumn("score", F.coalesce("label", "score"))
            .drop("label")
        )
    for _ in range(n_iter):
        agg = (
            edges.join(scores.withColumnRenamed("id", "dst"), "dst")
            .groupBy("src")
            .agg(
                (F.sum(F.col("weight") * F.col("score")) / F.sum("weight")).alias(
                    "new_score"
                )
            )
            .withColumnRenamed("src", "id")
        )
        scores = (
            scores.join(agg, "id", "left")
            .withColumn("score", F.coalesce("new_score", "score"))
            .drop("new_score")
        )
        if lab_df is not None:
            scores = (
                scores.join(lab_df, "id", "left")
                .withColumn("score", F.coalesce("label", "score"))
                .drop("label")
            )
    return scores
