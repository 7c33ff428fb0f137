"""Catalyst distance expressions vs numpy and vs the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.metrics import get_metric
from repro.oracle import assert_equivalent
from repro.spark.vectors import distance_expr


def pairs_df(seed=0, n=40, dim=5, positive=False):
    g = np.random.default_rng(seed)
    A = g.random((n, dim)) + 0.01 if positive else g.normal(size=(n, dim))
    B = g.random((n, dim)) + 0.01 if positive else g.normal(size=(n, dim))
    return pd.DataFrame(
        {"id": np.arange(n), "fa": list(A), "fb": list(B)}
    ), A, B


@pytest.mark.parametrize("metric", ["euclidean", "manhattan", "angular"])
def test_matches_numpy(spark, metric):
    pdf, A, B = pairs_df(positive=(metric == "angular"))
    sdf = spark.createDataFrame(pdf)
    got = (
        sdf.select("id", distance_expr("fa", "fb", metric).alias("d"))
        .toPandas()
        .sort_values("id")
    )
    m = get_metric(metric)
    want = np.array([m.pairwise(A[i : i + 1], B[i : i + 1])[0, 0] for i in range(len(A))])
    assert np.allclose(got["d"].to_numpy(), want, atol=1e-9)


def test_euclidean_oracle(spark):
    pdf, _, _ = pairs_df(seed=1)
    sdf = spark.createDataFrame(pdf)
    got = sdf.select("id", distance_expr("fa", "fb", "euclidean").alias("d"))
    assert_equivalent(
        got, "select id, list_distance(fa, fb) as d from pairs", pairs=pdf
    )


def test_manhattan_oracle(spark):
    pdf, _, _ = pairs_df(seed=2)
    sdf = spark.createDataFrame(pdf)
    got = sdf.select("id", distance_expr("fa", "fb", "manhattan").alias("d"))
    assert_equivalent(
        got,
        "select id, list_sum(list_transform(list_zip(fa, fb), "
        "x -> abs(x[1] - x[2]))) as d from pairs",
        pairs=pdf,
    )


def test_angular_oracle(spark):
    pdf, _, _ = pairs_df(seed=3, positive=True)
    sdf = spark.createDataFrame(pdf)
    got = sdf.select("id", distance_expr("fa", "fb", "angular").alias("d"))
    assert_equivalent(
        got,
        "select id, acos(greatest(-1.0, least(1.0, "
        "list_inner_product(fa, fb) / (sqrt(list_inner_product(fa, fa)) * "
        "sqrt(list_inner_product(fb, fb)))))) as d from pairs",
        pairs=pdf,
    )


def test_unknown_metric_rejected():
    with pytest.raises(ValueError):
        distance_expr("a", "b", "chebyshev")


def test_self_distance_zero(spark):
    pdf, _, _ = pairs_df(seed=4)
    pdf["fb"] = pdf["fa"]
    sdf = spark.createDataFrame(pdf)
    got = sdf.select(F.max(distance_expr("fa", "fb", "euclidean")).alias("mx")).first()
    assert got["mx"] == pytest.approx(0.0, abs=1e-9)
