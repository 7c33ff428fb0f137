"""SFDM2 (Algorithm 3): fairness for arbitrary m, (1-eps)/(3m+2) bound."""
import numpy as np
import pytest

from repro.core.sfdm2 import SFDM2
from repro.diversity import brute_fair_opt, div
from repro.extent import exact_extent
from repro.metrics import get_metric

MET = get_metric("euclidean")


def run(X, grp, ks, eps=0.1, metric="euclidean"):
    met = get_metric(metric)
    d_min, d_max = exact_extent(X, met)
    s = SFDM2(metric, ks=ks, eps=eps, d_min=d_min, d_max=d_max, dim=X.shape[1])
    s.update(X, grp)
    return s.solve()


def instance(seed, n=150, m=3):
    g = np.random.default_rng(seed)
    return g.normal(size=(n, 2)) * 3, g.integers(0, m, n)


@pytest.mark.parametrize("m", [2, 3, 5, 8])
def test_exact_group_counts(m):
    X, grp = instance(0, n=400, m=m)
    ks = {i: 2 for i in range(m)}
    r = run(X, grp, ks)
    for i in range(m):
        assert int((r.groups == i).sum()) == 2


def test_uneven_quotas():
    X, grp = instance(1, m=3)
    r = run(X, grp, {0: 1, 1: 4, 2: 2})
    assert [int((r.groups == i).sum()) for i in range(3)] == [1, 4, 2]


def test_diversity_consistent():
    X, grp = instance(2)
    r = run(X, grp, {0: 2, 1: 2, 2: 2})
    assert r.diversity == pytest.approx(div(r.feats, MET))


@pytest.mark.parametrize("seed", range(10))
def test_bound_m2(seed):
    g = np.random.default_rng(seed)
    X = g.normal(size=(12, 2))
    grp = np.array([0, 1] * 6)
    ks = {0: 2, 1: 2}
    eps = 0.1
    optf = brute_fair_opt(X, grp, ks, MET)
    r = run(X, grp, ks, eps=eps)
    assert r.diversity >= (1 - eps) / (3 * 2 + 2) * optf - 1e-9


@pytest.mark.parametrize("seed", range(6))
def test_bound_m3(seed):
    g = np.random.default_rng(seed + 30)
    X = g.normal(size=(12, 2))
    grp = np.array([0, 1, 2] * 4)
    ks = {0: 1, 1: 1, 2: 2}
    eps = 0.1
    optf = brute_fair_opt(X, grp, ks, MET)
    r = run(X, grp, ks, eps=eps)
    assert r.diversity >= (1 - eps) / (3 * 3 + 2) * optf - 1e-9


def test_chunked_updates_match_oneshot():
    X, grp = instance(3, n=250, m=4)
    ks = {i: 2 for i in range(4)}
    d_min, d_max = exact_extent(X, MET)
    a = SFDM2("euclidean", ks=ks, eps=0.1, d_min=d_min, d_max=d_max, dim=2)
    b = SFDM2("euclidean", ks=ks, eps=0.1, d_min=d_min, d_max=d_max, dim=2)
    a.update(X, grp)
    for i in range(0, 250, 31):
        b.update(X[i : i + 31], grp[i : i + 31])
    ra, rb = a.solve(), b.solve()
    assert ra.diversity == pytest.approx(rb.diversity)
    assert np.array_equal(ra.indices, rb.indices)


def test_space_bound_linear_in_m():
    d_min = None
    stored = {}
    for m in (2, 6):
        X, grp = instance(5, n=3000, m=m)
        ks = {i: 1 for i in range(m)}
        lo, hi = exact_extent(X, MET)
        s = SFDM2("euclidean", ks=ks, eps=0.1, d_min=lo, d_max=hi, dim=2)
        s.update(X, grp)
        r = s.solve()
        k = m
        # m+1 candidates of cap k each per guess
        assert r.n_stored <= (m + 1) * k * len(s.mus)
        stored[m] = r.n_stored
    assert stored[6] > stored[2]  # grows with m (paper: near-linear)


def test_skewed_many_groups():
    g = np.random.default_rng(7)
    n = 600
    X = g.normal(size=(n, 3))
    probs = np.array([0.5, 0.2, 0.1, 0.1, 0.05, 0.05])
    grp = g.choice(6, size=n, p=probs)
    ks = {i: 2 for i in range(6)}
    r = run(X, grp, ks)
    for i in range(6):
        assert int((r.groups == i).sum()) == 2


@pytest.mark.parametrize("metric", ["manhattan", "angular"])
def test_other_metrics(metric):
    g = np.random.default_rng(8)
    X = g.random((200, 6)) + 0.01
    grp = g.integers(0, 3, 200)
    r = run(X, grp, {0: 2, 1: 2, 2: 2}, metric=metric)
    assert len(r.indices) == 6
    assert r.diversity > 0


def test_sfdm2_geq_quality_floor_vs_sfdm1():
    # paper: SFDM2's greedy augmentation makes it competitive with SFDM1
    from repro.core.sfdm1 import SFDM1

    g = np.random.default_rng(9)
    X = g.normal(size=(500, 2)) * 4
    grp = g.integers(0, 2, 500)
    ks = {0: 5, 1: 5}
    lo, hi = exact_extent(X, MET)
    s1 = SFDM1("euclidean", ks=ks, eps=0.1, d_min=lo, d_max=hi, dim=2)
    s1.update(X, grp)
    r1 = s1.solve()
    r2 = run(X, grp, ks)
    assert r2.diversity >= 0.5 * r1.diversity


def test_infeasible_quota_raises():
    g = np.random.default_rng(10)
    X = g.normal(size=(40, 2))
    grp = np.zeros(40, dtype=int)
    with pytest.raises(RuntimeError):
        run(X, grp, {0: 2, 1: 2})
