"""Distributed GBABS over a Spark DataFrame (the repro's Spark layering).

Per the reproduction plan (DESIGN.md): granulation is embarrassingly
parallel per shard, boundary detection is global and relational.

* ``granulate_partitions`` — runs RD-GBG **per partition** with
  ``mapInPandas``; emits one row per covered sample tagged with a
  globally unique ``ball_key`` and an ``is_center`` flag (RD-GBG centers
  are real samples). Class-noise rows detected by RD-GBG are dropped
  here and never reach the output.
* ``borderline_pairs_df`` — melts the ball centers to long form
  ``(dim, val, ball_key, label)`` with ``stack`` and finds, per
  dimension, adjacent centers with different labels using a Catalyst
  window (``lead`` over ``ORDER BY val``). Pure Spark SQL — this step is
  oracle-checked against an equivalent DuckDB window query in tests.
* ``gbabs_sample_df`` — joins the pairs back to ball members and picks
  the two facing extreme samples per pair with ``max_by`` / ``min_by``,
  then semi-joins the original rows.

With ``num_partitions=1`` this computes exactly the single-node
Algorithm 2; with more partitions each shard granulates locally (balls
are non-overlapping *within* a shard) while boundary detection still
sees every ball — the natural data-parallel approximation the
calibration hint prescribes.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from .rdgbg import rd_gbg

__all__ = [
    "to_spark_df",
    "granulate_partitions",
    "borderline_pairs_df",
    "gbabs_sample_df",
]

SID = "_sid"


def to_spark_df(spark: SparkSession, X: np.ndarray, y: np.ndarray) -> DataFrame:
    """Wrap ``(X, y)`` as a DataFrame with columns f0..f{p-1}, label, _sid."""
    p = X.shape[1]
    pdf = pd.DataFrame(X, columns=[f"f{j}" for j in range(p)])
    pdf["label"] = y.astype(np.int64)
    pdf[SID] = np.arange(len(y), dtype=np.int64)
    return spark.createDataFrame(pdf)


def _feature_cols(df: DataFrame) -> list[str]:
    return [c for c in df.columns if c.startswith("f")]


def granulate_partitions(
    df: DataFrame, *, rho: int = 5, seed: int = 0, num_partitions: int | None = None
) -> DataFrame:
    """Per-partition RD-GBG: rows of covered samples tagged with their ball.

    Output columns: ``_sid``, features, ``label``, ``ball_key``
    (``"<partition>_<ball>"``), ``is_center``. Noise rows are absent.
    """
    feats = _feature_cols(df)
    if num_partitions is not None:
        df = df.repartition(num_partitions)

    out_schema = (
        f"{SID} long, "
        + ", ".join(f"{c} double" for c in feats)
        + ", label long, ball_key string, is_center boolean"
    )

    def run(iterator: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from pyspark import TaskContext

        pid = TaskContext.get().partitionId()
        for pdf in iterator:
            if len(pdf) == 0:
                continue
            X = pdf[feats].to_numpy(dtype=np.float64)
            y = pdf["label"].to_numpy()
            sids = pdf[SID].to_numpy()
            gbset = rd_gbg(X, y, rho=rho, seed=seed + pid)
            rows = []
            for bi, ball in enumerate(gbset.balls):
                key = f"{pid}_{bi}"
                for k, row in enumerate(ball.idx):
                    rows.append(
                        (int(sids[row]), *X[row].tolist(), int(y[row]), key, k == 0)
                    )
            if rows:
                yield pd.DataFrame(
                    rows, columns=[SID, *feats, "label", "ball_key", "is_center"]
                )

    return df.mapInPandas(run, schema=out_schema)


def _melt(df: DataFrame, feats: list[str], keep: list[str]) -> DataFrame:
    """Wide→long: one row per (kept cols, dim, val) via ``stack``."""
    pairs = ", ".join(f"{j}, {c}" for j, c in enumerate(feats))
    stacked = f"stack({len(feats)}, {pairs}) as (dim, val)"
    return df.selectExpr(*keep, stacked)


def borderline_pairs_df(balls: DataFrame) -> DataFrame:
    """Adjacent heterogeneous center pairs per dimension (Catalyst windows).

    Input: output of :func:`granulate_partitions`. Output columns:
    ``dim``, ``lo_ball``, ``hi_ball`` — the lower/upper ball keys of each
    heterogeneous adjacency in the per-dimension center ordering (ties
    broken by ball_key, matching the numpy reference's lexsort).
    """
    feats = _feature_cols(balls)
    centers = balls.filter(F.col("is_center"))
    long = _melt(centers, feats, ["ball_key", "label"])
    w = Window.partitionBy("dim").orderBy("val", "ball_key")
    return (
        long.withColumn("nxt_label", F.lead("label").over(w))
        .withColumn("nxt_ball", F.lead("ball_key").over(w))
        .filter(F.col("nxt_label").isNotNull() & (F.col("label") != F.col("nxt_label")))
        .select(
            "dim",
            F.col("ball_key").alias("lo_ball"),
            F.col("nxt_ball").alias("hi_ball"),
        )
    )


def gbabs_sample_df(
    df: DataFrame, *, rho: int = 5, seed: int = 0, num_partitions: int | None = None
) -> DataFrame:
    """Distributed Algorithm 2: returns the sampled rows of ``df``.

    ``df`` must have columns f0..f{p-1}, ``label``, ``_sid`` (see
    :func:`to_spark_df`).
    """
    feats = _feature_cols(df)
    balls = granulate_partitions(
        df, rho=rho, seed=seed, num_partitions=num_partitions
    ).cache()
    pairs = borderline_pairs_df(balls)
    members = (
        _melt(balls, feats, [SID, "ball_key"])
        .withColumnRenamed("dim", "mdim")
        .withColumnRenamed("ball_key", "mball")
    )

    lo = (
        pairs.join(
            members,
            (pairs.lo_ball == members.mball) & (pairs.dim == members.mdim),
            "inner",
        )
        .groupBy("dim", "lo_ball", "hi_ball")
        .agg(F.expr(f"max_by({SID}, val)").alias(SID))
    )
    hi = (
        pairs.join(
            members,
            (pairs.hi_ball == members.mball) & (pairs.dim == members.mdim),
            "inner",
        )
        .groupBy("dim", "lo_ball", "hi_ball")
        .agg(F.expr(f"min_by({SID}, val)").alias(SID))
    )
    picked = lo.select(SID).union(hi.select(SID)).distinct()
    return df.join(picked, on=SID, how="left_semi")
