"""FairDiv coresets (paper Section 4 / Theorem 4.2) — the distributed stage.

Theorem 4.2 says *any* constant-approximation k-center algorithm, run
per color, yields a (1+eps)-coreset for FairDiv. That generality is what
makes the construction distribution-friendly: the two-round composable
Gonzalez (partition-local centers, then Gonzalez over the union of
partial centers) is itself a constant-factor k-center algorithm, so the
union of its per-color outputs is a valid coreset.

This module is the only part of the pipeline that touches all n points;
everything downstream (MWU, rounding, baselines-on-coreset) works on the
O(m k) coreset on the driver, exactly as in the authors' artifact.

Spark pipeline shape::

    df.groupBy(color, spark_partition_id())
      .applyInPandas(local_gonzalez)      # map: O(n_part * k) numpy flops
      .groupBy(color)
      .applyInPandas(merge_gonzalez)      # reduce: O(P * k^2) per color

Shuffle volume after the map stage is O(m * partitions * k) rows.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .gonzalez import gonzalez


def feature_columns(df) -> list[str]:
    """The point-coordinate columns: every column named x0, x1, ..."""
    return sorted(
        (c for c in df.columns if c.startswith("x") and c[1:].isdigit()),
        key=lambda c: int(c[1:]),
    )


def coreset_numpy(
    X: np.ndarray, colors: np.ndarray, per_color_k: int
) -> tuple[np.ndarray, np.ndarray]:
    """Serial reference: per-color Gonzalez (the authors' implementation:
    k iterations per color, coreset size <= m*k). Returns (indices, colors)."""
    out = []
    for j in np.unique(colors):
        idx = np.where(colors == j)[0]
        out.append(idx[gonzalez(X[idx], per_color_k)])
    sel = np.concatenate(out)
    return sel, np.asarray(colors)[sel]


def coreset_spark(
    df: DataFrame,
    per_color_k: int,
    *,
    color_col: str = "color",
    two_stage: bool = True,
) -> pd.DataFrame:
    """Distributed per-color coreset; returns the O(m k) coreset as pandas.

    ``two_stage=True`` runs the composable map/reduce pipeline above;
    ``two_stage=False`` runs one Gonzalez task per color (useful to
    validate that the composable variant loses nothing that matters).
    """
    feats = feature_columns(df)
    schema = df.select(*feats, color_col).schema

    def local(pdf: pd.DataFrame) -> pd.DataFrame:
        X = pdf[feats].to_numpy(dtype=np.float64)
        idx = gonzalez(X, per_color_k)
        return pdf.iloc[idx][feats + [color_col]]

    work = df.select(*feats, color_col)
    if two_stage:
        staged = (
            work.withColumn("_pid", F.spark_partition_id())
            .groupBy(color_col, "_pid")
            .applyInPandas(lambda p: local(p), schema=schema)
        )
    else:
        staged = work
    final = staged.groupBy(color_col).applyInPandas(lambda p: local(p), schema=schema)
    return final.toPandas()


def coreset_arrays(
    df: DataFrame, per_color_k: int, *, color_col: str = "color", two_stage: bool = True
) -> tuple[np.ndarray, np.ndarray]:
    """Convenience: distributed coreset as (X, colors) numpy arrays."""
    pdf = coreset_spark(df, per_color_k, color_col=color_col, two_stage=two_stage)
    feats = feature_columns(pdf)
    return (
        pdf[feats].to_numpy(dtype=np.float64),
        pdf[color_col].to_numpy(dtype=np.int64),
    )


def to_spark_points(
    spark: SparkSession, X: np.ndarray, colors: np.ndarray, *, n_partitions: int | None = None
) -> DataFrame:
    """Package (X, colors) numpy arrays as a Spark DataFrame x0..x{d-1}, color."""
    X = np.asarray(X, dtype=np.float64)
    pdf = pd.DataFrame(X, columns=[f"x{i}" for i in range(X.shape[1])])
    pdf["color"] = np.asarray(colors, dtype=np.int64)
    sdf = spark.createDataFrame(pdf)
    return sdf.repartition(n_partitions) if n_partitions else sdf
