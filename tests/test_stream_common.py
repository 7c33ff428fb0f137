"""Algorithm factory + SFDM1 swap-balance helper edge cases."""
import numpy as np
import pytest

from repro._stream_common import make_algo
from repro.core.sfdm1 import SFDM1, swap_balance
from repro.core.sfdm2 import SFDM2
from repro.metrics import get_metric

MET = get_metric("euclidean")


def test_factory_builds_sfdm1():
    a = make_algo("sfdm1", "euclidean", ks={0: 1, 1: 1}, eps=0.1, d_min=1, d_max=2, dim=2)
    assert isinstance(a, SFDM1)


def test_factory_builds_sfdm2():
    a = make_algo("sfdm2", "manhattan", ks={0: 1, 1: 1, 2: 1}, eps=0.1, d_min=1, d_max=2, dim=3)
    assert isinstance(a, SFDM2)


def test_factory_rejects_unknown():
    with pytest.raises(ValueError):
        make_algo("sfdm3", "euclidean", ks={0: 1}, eps=0.1, d_min=1, d_max=2, dim=2)


def _line(vals):
    return np.array(vals, dtype=float)[:, None]


def test_swap_balance_inserts_far_first():
    # group 0 under-filled (needs 2); pool has one far and one near element
    feats = _line([0.0, 100.0, 1.0, 50.0, 99.0])
    groups = np.array([0, 1, 1, 0, 0])
    # sol = {0 (g0), 1 (g1), 2 (g1)}; need k0=2 -> insert from pool {3, 4}
    sol = swap_balance(feats, groups, [0, 1, 2], [3, 4], 0, 2, 3, MET)
    assert sol is not None and len(sol) == 3
    assert sum(1 for x in sol if groups[x] == 0) == 2
    # the far pool element (50.0, idx 3) is farther from S∩X_0={0.0} than 99.0?
    # d(50,0)=50 < d(99,0)=99 -> picks 4 first; then deletes nearest group-1
    assert 4 in sol


def test_swap_balance_deletes_closest_other():
    feats = _line([0.0, 10.0, 10.5, 30.0])
    groups = np.array([0, 1, 1, 0])
    # sol has 1 of group 0, need 2; pool = [3]; then drop the group-1 element
    # closest to group-0 side: element 2? d(10,{0,30})=10, d(10.5,{0,30})=10.5
    sol = swap_balance(feats, groups, [0, 1, 2], [3], 0, 2, 3, MET)
    assert sorted(sol) == [0, 2, 3] or sorted(sol) == [0, 1, 3]
    # element removed is the one closest to S cap X_0 = {0, 30}
    assert 1 not in sol  # d(10, {0,30}) = 10 < d(10.5, {0,30}) = 10.5? both -> 10 closer


def test_swap_balance_pool_exhausted_returns_none():
    feats = _line([0.0, 1.0, 2.0])
    groups = np.array([1, 1, 1])
    # group 0 has no members anywhere; pool empty -> None
    assert swap_balance(feats, groups, [0, 1], [], 0, 1, 2, MET) is None


def test_swap_balance_pool_overlap_with_solution_ignored():
    feats = _line([0.0, 5.0, 9.0, 14.0])
    groups = np.array([0, 1, 0, 1])
    # pool contains an element already in sol (0): must not loop forever
    sol = swap_balance(feats, groups, [0, 1, 3], [0, 2], 0, 2, 3, MET)
    assert sol is not None
    assert sum(1 for x in sol if groups[x] == 0) == 2


def test_swap_balance_noop_when_already_fair():
    feats = _line([0.0, 5.0])
    groups = np.array([0, 1])
    sol = swap_balance(feats, groups, [0, 1], [], 0, 1, 2, MET)
    assert sorted(sol) == [0, 1]
