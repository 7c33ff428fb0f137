"""Benchmark for Table II — every algorithm on representative configurations.

One pedantic round per algorithm (the full-scale Table II numbers are
produced by ``jobs/table2.py``; these benchmarks track the same code paths
at n = 10,000 so regressions are visible in seconds, not minutes).

Streaming algorithms are additionally split into their two phases —
``stream`` (one-pass update; the paper's per-element update time) and
``post`` (solution computation; the paper's Table II time column).
"""
import numpy as np
import pytest

from repro._stream_common import make_algo
from repro.datasets import adult_like, census_like, equal_quotas
from repro.extent import estimate_extent
from repro.harness.measures import run_algo

N = 10_000
K = 20


def _config(m):
    if m == 2:
        ds = adult_like(N, "sex")
    else:
        ds = census_like(N, "sex+age")  # m = 14
    ks = equal_quotas(K, ds.groups)
    return ds, ks


@pytest.mark.parametrize("algo", ["GMM", "FairSwap", "FairFlow", "SFDM1", "SFDM2"])
def test_full_run_m2(benchmark, algo):
    ds, ks = _config(2)
    m = benchmark.pedantic(
        lambda: run_algo(algo, ds, ks, eps=0.1, seed=0), rounds=1, iterations=1
    )
    assert m.diversity > 0


@pytest.mark.parametrize("algo", ["GMM", "FairFlow", "SFDM2"])
def test_full_run_m14(benchmark, algo):
    ds, ks = _config(14)
    m = benchmark.pedantic(
        lambda: run_algo(algo, ds, ks, eps=0.1, seed=0), rounds=1, iterations=1
    )
    assert m.diversity > 0


@pytest.mark.parametrize("algo", ["sfdm1", "sfdm2"])
def test_stream_phase(benchmark, algo):
    ds, ks = _config(2)
    extent = estimate_extent(ds.feats, ds.metric)

    def stream():
        s = make_algo(
            algo, ds.metric_name, ks=ks, eps=0.1,
            d_min=extent[0], d_max=extent[1], dim=ds.dim,
        )
        s.update(ds.feats, ds.groups)
        return s

    s = benchmark.pedantic(stream, rounds=1, iterations=1)
    assert s.state.n_stored > 0


@pytest.mark.parametrize("algo", ["sfdm1", "sfdm2"])
def test_post_phase(benchmark, algo):
    ds, ks = _config(2)
    extent = estimate_extent(ds.feats, ds.metric)
    s = make_algo(
        algo, ds.metric_name, ks=ks, eps=0.1,
        d_min=extent[0], d_max=extent[1], dim=ds.dim,
    )
    s.update(ds.feats, ds.groups)
    res = benchmark.pedantic(s.solve, rounds=3, iterations=1)
    assert np.unique(res.groups, return_counts=True)[1].sum() == K
