"""Partition matroids and Algorithm 4 (matroid intersection)."""
from itertools import combinations

import numpy as np
import pytest

from repro.matroid.intersection import max_common_independent_set
from repro.matroid.partition import PartitionMatroid
from repro.metrics import get_metric

MET = get_metric("euclidean")


def brute_max_intersection(m1: PartitionMatroid, m2: PartitionMatroid) -> int:
    """Exhaustive maximum common independent set size (tiny ground sets)."""
    n = len(m1.labels)
    best = 0
    for size in range(n, 0, -1):
        for comb in combinations(range(n), size):
            arr = np.array(comb)
            if m1.is_independent(arr) and m2.is_independent(arr):
                return size
    return best


# -- partition matroid axioms ------------------------------------------------

def random_matroid(seed, n=8, n_labels=3, max_cap=2):
    g = np.random.default_rng(seed)
    labels = g.integers(0, n_labels, n)
    caps = {int(l): int(g.integers(1, max_cap + 1)) for l in range(n_labels)}
    return PartitionMatroid(labels, caps)


@pytest.mark.parametrize("seed", range(6))
def test_hereditary_property(seed):
    m = random_matroid(seed)
    g = np.random.default_rng(seed + 100)
    n = len(m.labels)
    for _ in range(20):
        B = np.flatnonzero(g.random(n) < 0.5)
        if m.is_independent(B) and len(B) > 0:
            A = B[g.random(len(B)) < 0.5]
            assert m.is_independent(A)


@pytest.mark.parametrize("seed", range(6))
def test_augmentation_property(seed):
    m = random_matroid(seed)
    g = np.random.default_rng(seed + 200)
    n = len(m.labels)
    for _ in range(30):
        A = np.flatnonzero(g.random(n) < 0.5)
        B = np.flatnonzero(g.random(n) < 0.3)
        if not (m.is_independent(A) and m.is_independent(B)):
            continue
        if len(A) <= len(B):
            continue
        # exchange: some x in A\B with B+x independent
        assert any(
            m.is_independent(np.append(B, x)) for x in set(A) - set(B)
        )


def test_rank_computation():
    m = PartitionMatroid(np.array([0, 0, 0, 1, 1, 2]), {0: 2, 1: 5, 2: 1})
    assert m.rank() == 2 + 2 + 1


def test_uniform_cap_constructor():
    m = PartitionMatroid(np.array([0, 1, 1, 2]), 1)
    assert m.rank() == 3


def test_can_add_respects_caps():
    m = PartitionMatroid(np.array([0, 0, 1]), {0: 1, 1: 1})
    assert m.can_add({}, 0)
    assert not m.can_add({0: 1}, 1)  # element 1 has label 0, label full


# -- Algorithm 4 -------------------------------------------------------------

@pytest.mark.parametrize("seed", range(12))
def test_intersection_is_maximum(seed):
    g = np.random.default_rng(seed)
    n = 9
    l1 = g.integers(0, 3, n)
    l2 = g.integers(0, 4, n)
    m1 = PartitionMatroid(l1, {i: int(g.integers(1, 3)) for i in range(3)})
    m2 = PartitionMatroid(l2, 1)
    S = max_common_independent_set(m1, m2)
    arr = np.array(sorted(S))
    assert m1.is_independent(arr) and m2.is_independent(arr)
    assert len(S) == brute_max_intersection(m1, m2)


@pytest.mark.parametrize("seed", range(8))
def test_intersection_with_nonempty_init(seed):
    g = np.random.default_rng(seed + 50)
    n = 9
    l1 = g.integers(0, 3, n)
    l2 = g.integers(0, 5, n)
    m1 = PartitionMatroid(l1, {i: 2 for i in range(3)})
    m2 = PartitionMatroid(l2, 1)
    # build a valid init greedily
    init, c1, c2 = set(), {}, {}
    for x in range(n):
        if m1.can_add(c1, x) and m2.can_add(c2, x) and len(init) < 2:
            init.add(x)
            c1[int(l1[x])] = c1.get(int(l1[x]), 0) + 1
            c2[int(l2[x])] = c2.get(int(l2[x]), 0) + 1
    S = max_common_independent_set(m1, m2, init=init)
    arr = np.array(sorted(S))
    assert m1.is_independent(arr) and m2.is_independent(arr)
    assert len(S) == brute_max_intersection(m1, m2)


def test_invalid_init_rejected():
    m1 = PartitionMatroid(np.array([0, 0]), {0: 1})
    m2 = PartitionMatroid(np.array([0, 1]), 1)
    with pytest.raises(ValueError, match="init"):
        max_common_independent_set(m1, m2, init={0, 1})


def test_target_stops_early():
    n = 6
    m1 = PartitionMatroid(np.zeros(n, dtype=int), {0: 6})
    m2 = PartitionMatroid(np.arange(n), 1)
    S = max_common_independent_set(m1, m2, target=3)
    assert len(S) == 3


def test_greedy_prefers_far_elements():
    feats = np.array([[0.0], [1.0], [10.0], [11.0]])
    D = MET.pairwise(feats, feats)
    m1 = PartitionMatroid(np.array([0, 0, 0, 0]), {0: 2})
    m2 = PartitionMatroid(np.array([0, 1, 2, 3]), 1)
    S = max_common_independent_set(m1, m2, dist_matrix=D, target=2)
    picked = sorted(S)
    # the two chosen points should span the far gap, not be neighbors
    assert abs(feats[picked[0], 0] - feats[picked[1], 0]) >= 9.0


def test_augmentation_needed_case():
    # greedy stalls: clusters {0,1} both free only via exchange.
    # l1 groups: a has cap 1 taken by an element blocking cluster of b, etc.
    l1 = np.array([0, 0, 1])
    l2 = np.array([0, 1, 0])
    m1 = PartitionMatroid(l1, {0: 1, 1: 1})
    m2 = PartitionMatroid(l2, 1)
    # init = {0}: element 0 (group 0, cluster 0). Element 2 (group 1, cluster 0)
    # blocked by cluster; element 1 (group 0, cluster 1) blocked by group.
    # Max = 2 via {1, 2}; requires an augmenting path.
    S = max_common_independent_set(m1, m2, init={0})
    assert len(S) == 2
    arr = np.array(sorted(S))
    assert m1.is_independent(arr) and m2.is_independent(arr)
