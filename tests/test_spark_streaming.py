"""Structured Streaming FDM job: end-to-end correctness of the foreachBatch
runner with the broadcast-state prefilter."""
import os

import numpy as np
import pytest

from repro.datasets import blobs
from repro.diversity import brute_fair_opt
from repro.extent import exact_extent
from repro.spark.streaming import run_streaming_fdm, write_stream_input


def test_write_stream_input_files(tmp_path):
    ds = blobs(100, 2, seed=0)
    path = str(tmp_path / "in")
    write_stream_input(ds, path, n_files=5)
    files = sorted(os.listdir(path))
    assert len(files) == 5
    assert all(f.endswith(".parquet") for f in files)


@pytest.mark.parametrize("algo", ["sfdm1", "sfdm2"])
def test_streaming_job_fair_solution(spark, tmp_path, algo):
    ds = blobs(600, 2, seed=5)
    lo, hi = exact_extent(ds.feats, ds.metric)
    ks = {0: 3, 1: 3}
    inp = str(tmp_path / "input")
    write_stream_input(ds, inp, n_files=4)
    res, stats = run_streaming_fdm(
        spark, inp, algo=algo, metric=ds.metric_name, ks=ks, eps=0.1,
        d_min=lo, d_max=hi, dim=ds.dim, checkpoint_dir=str(tmp_path / "ckpt"),
    )
    assert int((res.groups == 0).sum()) == 3
    assert int((res.groups == 1).sum()) == 3
    assert stats.n_batches == 4
    assert stats.n_rows == 600
    assert stats.n_survivors <= stats.n_rows
    assert res.n_stored <= stats.n_survivors


def test_streaming_prefilter_drops_rows(spark, tmp_path):
    # with many batches, later batches should be heavily prefiltered
    ds = blobs(800, 2, seed=6)
    lo, hi = exact_extent(ds.feats, ds.metric)
    inp = str(tmp_path / "input")
    write_stream_input(ds, inp, n_files=8)
    res, stats = run_streaming_fdm(
        spark, inp, algo="sfdm2", metric=ds.metric_name, ks={0: 2, 1: 2},
        eps=0.2, d_min=lo, d_max=hi, dim=ds.dim,
        checkpoint_dir=str(tmp_path / "ckpt"),
    )
    assert stats.n_survivors < stats.n_rows  # prefilter did real work


def test_streaming_matches_theory_bound(spark, tmp_path):
    # tiny instance where brute-force OPT_f is computable
    g = np.random.default_rng(7)
    feats = g.normal(size=(12, 2))
    groups = np.array([0, 1] * 6)
    from repro.datasets import Dataset
    from repro.metrics import get_metric

    ds = Dataset("tiny", feats, groups, "euclidean")
    lo, hi = exact_extent(feats, get_metric("euclidean"))
    ks = {0: 2, 1: 2}
    optf = brute_fair_opt(feats, groups, ks, get_metric("euclidean"))
    inp = str(tmp_path / "input")
    write_stream_input(ds, inp, n_files=3)
    eps = 0.1
    res, _ = run_streaming_fdm(
        spark, inp, algo="sfdm1", metric="euclidean", ks=ks, eps=eps,
        d_min=lo, d_max=hi, dim=2, checkpoint_dir=str(tmp_path / "ckpt"),
    )
    # the run equals a sequential pass over some permutation -> bound holds
    assert res.diversity >= (1 - eps) / 4 * optf - 1e-9
