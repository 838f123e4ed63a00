"""Tests for the distributed GBABS (mapInPandas + Catalyst windows)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.gbabs import gbabs_sample
from repro.core.spark_gbabs import (
    SID,
    borderline_pairs_df,
    gbabs_sample_df,
    granulate_partitions,
    to_spark_df,
)
from repro.datasets.registry import load_dataset
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def s2(spark):
    X, y, _ = load_dataset("S2")
    return X, y, to_spark_df(spark, X, y)


def test_to_spark_df_schema(s2):
    X, y, df = s2
    assert df.count() == len(X)
    assert set(df.columns) == {f"f{j}" for j in range(X.shape[1])} | {"label", SID}


def test_single_partition_matches_numpy_exactly(s2):
    """num_partitions=1 is the paper's Algorithm 2, bit-for-bit."""
    X, y, df = s2
    got = sorted(
        r[SID] for r in gbabs_sample_df(df, rho=5, seed=0, num_partitions=1).select(SID).collect()
    )
    idx, _ = gbabs_sample(X, y, rho=5, seed=0)
    assert got == idx.tolist()


def test_granulate_partitions_purity_and_keys(s2):
    X, y, df = s2
    balls = granulate_partitions(df, rho=5, seed=0, num_partitions=2).toPandas()
    # every ball has exactly one center and a single label
    per_ball = balls.groupby("ball_key").agg(
        n_labels=("label", "nunique"), n_centers=("is_center", "sum")
    )
    assert (per_ball["n_labels"] == 1).all()
    assert (per_ball["n_centers"] == 1).all()


def test_granulate_partitions_covers_subset_of_rows(s2):
    X, y, df = s2
    balls = granulate_partitions(df, rho=5, seed=0, num_partitions=2).toPandas()
    sids = set(balls[SID])
    assert sids <= set(range(len(X)))
    assert not balls[SID].duplicated().any()  # partition of covered rows


@pytest.mark.parametrize("parts", [2, 4])
def test_multi_partition_sample_is_subset_with_sane_ratio(s2, parts):
    X, y, df = s2
    sampled = gbabs_sample_df(df, rho=5, seed=0, num_partitions=parts)
    pdf = sampled.toPandas()
    assert set(pdf[SID]) <= set(range(len(X)))
    assert 0.02 < len(pdf) / len(X) < 1.0
    # sampled rows keep their original labels
    assert (pdf["label"].to_numpy() == y[pdf[SID].to_numpy()]).all()


def test_borderline_pairs_df_matches_duckdb_oracle(spark):
    """The Catalyst window query == the same SQL on DuckDB (the oracle)."""
    rng = np.random.default_rng(7)
    centers = pd.DataFrame(
        {
            SID: np.arange(40),
            "f0": rng.random(40),
            "f1": rng.random(40),
            "label": rng.integers(0, 3, 40).astype("int64"),
            "ball_key": [f"0_{i}" for i in range(40)],
            "is_center": True,
        }
    )
    balls_df = spark.createDataFrame(centers)
    got = borderline_pairs_df(balls_df).select("dim", "lo_ball", "hi_ball")
    sql = """
        WITH longf AS (
            SELECT ball_key, label, 0 AS dim, f0 AS val FROM centers
            UNION ALL
            SELECT ball_key, label, 1 AS dim, f1 AS val FROM centers
        ), w AS (
            SELECT dim, ball_key, label,
                   lead(label) OVER (PARTITION BY dim ORDER BY val, ball_key) AS nxt_label,
                   lead(ball_key) OVER (PARTITION BY dim ORDER BY val, ball_key) AS nxt_ball
            FROM longf
        )
        SELECT dim, ball_key AS lo_ball, nxt_ball AS hi_ball
        FROM w WHERE nxt_label IS NOT NULL AND label <> nxt_label
    """
    assert_equivalent(got, sql, centers=centers)


def test_borderline_pairs_df_matches_numpy_reference(spark, s2):
    from repro.core.gbabs import borderline_pairs
    from repro.core.rdgbg import rd_gbg

    X, y, df = s2
    balls_sdf = granulate_partitions(df, rho=5, seed=0, num_partitions=1)
    got = {
        (r["dim"], r["lo_ball"], r["hi_ball"])
        for r in borderline_pairs_df(balls_sdf).collect()
    }
    gbset = rd_gbg(X, y, rho=5, seed=0)
    want = {
        (d, f"0_{a}", f"0_{b}")
        for d, a, b in borderline_pairs(gbset.centers(), gbset.labels())
    }
    assert got == want


def test_noise_rows_never_emitted(spark):
    X, y, _ = load_dataset("S2", noise_ratio=0.3, noise_seed=1)
    from repro.core.rdgbg import rd_gbg

    df = to_spark_df(spark, X, y)
    balls = granulate_partitions(df, rho=5, seed=0, num_partitions=1).toPandas()
    gbset = rd_gbg(X, y, rho=5, seed=0)
    assert not set(balls[SID]) & set(gbset.noise_idx.tolist())
