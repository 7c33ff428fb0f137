"""Distributed extent estimation (Catalyst self-join) vs the numpy path."""
import numpy as np
import pytest

from repro.datasets import blobs, lyrics_like
from repro.extent import exact_extent
from repro.spark.extent import spark_extent


def test_small_dataset_matches_exact(spark):
    ds = blobs(120, 2, seed=3)
    lo, hi = spark_extent(ds.to_spark(spark), ds.metric_name, sample=200)
    d_min, d_max = exact_extent(ds.feats, ds.metric)
    assert lo == pytest.approx(d_min * 0.5, rel=1e-6)
    assert hi == pytest.approx(d_max * 2.0, rel=1e-6)


def test_sampled_brackets_truth(spark):
    ds = blobs(3000, 2, seed=4)
    lo, hi = spark_extent(ds.to_spark(spark), ds.metric_name, sample=300, seed=1)
    d_min, d_max = exact_extent(ds.feats, ds.metric)
    assert 0 < lo  # sampled min-nonzero scaled down
    assert hi >= d_max * 0.9  # x2 factor absorbs sampling shortfall


def test_angular_metric_path(spark):
    ds = lyrics_like(150)
    lo, hi = spark_extent(ds.to_spark(spark), "angular", sample=150)
    assert 0 < lo < hi <= np.pi


def test_identical_points_raise(spark):
    import pandas as pd

    pdf = pd.DataFrame({"id": [0, 1, 2], "group": [0, 0, 0],
                        "features": [[1.0, 1.0]] * 3})
    sdf = spark.createDataFrame(pdf)
    with pytest.raises(ValueError, match="identical"):
        spark_extent(sdf, "euclidean", sample=10)
