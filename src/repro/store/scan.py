"""Exact maximum-inner-product search as a Spark DataFrame computation.

The vector database is a DataFrame ``(vec_id, image_id, is_coarse, vector)``
(see :meth:`repro.embed.clipsim.EmbeddedDataset.to_vector_df`). Scoring is a
pandas UDF (vectorized numpy dot products over Arrow batches); top-k and the
max-per-image multiscale aggregation are plain Catalyst operators, so the
whole lookup is one DataFrame pipeline. Correctness is oracle-checked
against DuckDB's ``list_inner_product`` in ``tests/test_store.py``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import DoubleType


def score_vectors(vec_df: DataFrame, q: np.ndarray) -> DataFrame:
    """Append a ``score = vector . q`` column via a vectorized pandas UDF."""
    qb = np.asarray(q, dtype=np.float64)

    @pandas_udf(DoubleType())
    def dot_q(vectors: pd.Series) -> pd.Series:
        mat = np.stack(vectors.to_numpy())
        return pd.Series(mat @ qb)

    return vec_df.withColumn("score", dot_q(F.col("vector")))


def topk_vectors(vec_df: DataFrame, q: np.ndarray, k: int) -> DataFrame:
    """Top-k vectors by inner product with ``q`` — the store's raw lookup."""
    return (
        score_vectors(vec_df, q)
        .select("vec_id", "image_id", "is_coarse", "score")
        .orderBy(F.desc("score"), F.asc("vec_id"))
        .limit(k)
    )


def topk_images(
    vec_df: DataFrame, q: np.ndarray, k: int, *, exclude_images: list[int] | None = None
) -> DataFrame:
    """Top-k *images*, scored as the max over their patch vectors (§4.3).

    ``exclude_images`` drops already-shown images (the interactive loop's
    "unseen" constraint) before ranking.
    """
    scored = score_vectors(vec_df, q)
    if exclude_images:
        scored = scored.where(~F.col("image_id").isin([int(i) for i in exclude_images]))
    return (
        scored.groupBy("image_id")
        .agg(F.max("score").alias("score"))
        .orderBy(F.desc("score"), F.asc("image_id"))
        .limit(k)
    )
