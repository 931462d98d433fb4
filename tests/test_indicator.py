"""Tests for the vectorized per-job indicator counting kernels."""
import numpy as np
import pandas as pd

from repro.core.indicator import per_job_counts, per_job_key_counts


def _df(spark, n=1000, seed=0):
    g = np.random.default_rng(seed)
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "k1": g.integers(0, 50, n),
                "k2": g.integers(0, 50, n),
                "x": g.integers(0, 20, n),
            }
        )
    ).repartition(4)


def test_per_job_counts_matches_pandas(spark):
    df = _df(spark)
    pdf = df.toPandas()
    jobs = [{"thr": t} for t in (5, 10, 49)]
    out = per_job_counts(df, jobs, lambda c, j: c["k1"].to_numpy() < j["thr"])
    for j, job in enumerate(jobs):
        assert out.loc[out["job"] == j, "cnt"].iloc[0] == (pdf["k1"] < job["thr"]).sum()


def test_per_job_counts_zero_fill(spark):
    df = _df(spark)
    jobs = [{"thr": -1}, {"thr": 100}]
    out = per_job_counts(df, jobs, lambda c, j: c["k1"].to_numpy() < j["thr"])
    assert out.loc[0, "cnt"] == 0
    assert out.loc[1, "cnt"] == df.count()


def test_per_job_counts_empty_jobs(spark):
    out = per_job_counts(_df(spark), [], lambda c, j: c["k1"].to_numpy() < 0)
    assert len(out) == 0


def test_per_job_key_counts_matches_pandas(spark):
    df = _df(spark)
    pdf = df.toPandas()
    jobs = [{"thr": 10}, {"thr": 25}]
    out = (
        per_job_key_counts(df, jobs, lambda c, j: c["k1"].to_numpy() < j["thr"], ["x"])
        .toPandas()
        .sort_values(["job", "key"])
    )
    for j, job in enumerate(jobs):
        want = pdf[pdf["k1"] < job["thr"]].groupby("x").size()
        got = out[out["job"] == j].set_index("key")["cnt"]
        assert got.to_dict() == want.to_dict()


def test_per_job_key_counts_multi_columns(spark):
    df = _df(spark)
    pdf = df.toPandas()
    jobs = [{"thr": 30}]
    out = (
        per_job_key_counts(
            df, jobs, lambda c, j: c["k1"].to_numpy() < j["thr"], ["x", "k2"]
        )
        .toPandas()
    )
    total = out["cnt"].sum()
    assert total == 2 * (pdf["k1"] < 30).sum()


def test_kernel_sees_batch_columns(spark):
    df = _df(spark)
    jobs = [{}]
    out = per_job_counts(
        df, jobs, lambda c, j: (c["k1"].to_numpy() + c["k2"].to_numpy()) % 2 == 0
    )
    pdf = df.toPandas()
    assert out.loc[0, "cnt"] == ((pdf["k1"] + pdf["k2"]) % 2 == 0).sum()
