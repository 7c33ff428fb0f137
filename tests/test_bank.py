"""StreamState / CandidateBank: acceptance semantics, chunk invariance,
snapshot prefilter safety."""
import numpy as np
import pytest

from repro.core.bank import StreamState, survives_snapshot
from repro.metrics import get_metric

MET = get_metric("euclidean")


def make_state(mus=(1.0, 2.0), k=3, caps=None, dim=2):
    return StreamState(MET, np.array(mus), dim, k, group_caps=caps)


def test_empty_candidate_accepts_anything():
    st = make_state()
    st.update(np.array([[0.0, 0.0]]))
    assert st.n_stored == 1
    assert list(st.blind.sizes) == [1, 1]


def test_threshold_acceptance():
    st = make_state(mus=(1.0, 2.0), k=5)
    st.update(np.array([[0.0, 0.0], [1.5, 0.0]]))
    # second point: d=1.5 -> accepted at mu=1.0, rejected at mu=2.0
    assert list(st.blind.sizes) == [2, 1]


def test_rejected_everywhere_not_stored():
    st = make_state(mus=(1.0,), k=5)
    st.update(np.array([[0.0, 0.0], [0.5, 0.0]]))
    assert st.n_stored == 1  # 0.5 < mu for the only guess


def test_full_candidate_stops_accepting():
    st = make_state(mus=(1.0,), k=2)
    st.update(np.array([[0.0, 0.0], [10.0, 0.0], [20.0, 0.0]]))
    assert st.blind.sizes[0] == 2
    assert st.n_stored == 2


def test_group_bank_filters_by_group():
    st = make_state(mus=(1.0,), k=4, caps={0: 2, 1: 2})
    st.update(np.array([[0.0, 0.0], [5.0, 0.0]]), groups=np.array([0, 1]))
    assert st.group_banks[0].sizes[0] == 1
    assert st.group_banks[1].sizes[0] == 1


def test_element_shared_across_banks_stored_once():
    st = make_state(mus=(1.0,), k=4, caps={0: 2})
    st.update(np.array([[0.0, 0.0]]), groups=np.array([0]))
    assert st.n_stored == 1
    assert st.blind.sizes[0] == 1 and st.group_banks[0].sizes[0] == 1


def test_store_growth_preserves_membership():
    st = make_state(mus=(0.5,), k=500)
    g = np.random.default_rng(0)
    X = g.normal(size=(300, 2)) * 100
    st.update(X)
    assert st.n_stored > 64  # grew past initial capacity
    idx = st.blind.indices(0, st.n_stored)
    assert len(idx) == st.blind.sizes[0]


def test_chunked_equals_oneshot():
    g = np.random.default_rng(1)
    X = g.normal(size=(200, 2))
    grp = g.integers(0, 2, 200)
    a = make_state(mus=(0.3, 0.6, 1.2), k=5, caps={0: 2, 1: 3})
    b = make_state(mus=(0.3, 0.6, 1.2), k=5, caps={0: 2, 1: 3})
    a.update(X, grp)
    for i in range(0, 200, 17):
        b.update(X[i : i + 17], grp[i : i + 17])
    assert a.n_stored == b.n_stored
    assert np.array_equal(a.feats, b.feats)
    assert np.array_equal(a.blind.sizes, b.blind.sizes)
    for grp_id in (0, 1):
        assert np.array_equal(
            a.group_banks[grp_id].member[:, : a.n_stored],
            b.group_banks[grp_id].member[:, : b.n_stored],
        )


def test_ids_tracked():
    st = make_state(mus=(0.1,), k=10)
    st.update(np.array([[0.0, 0.0], [5.0, 5.0]]), ids=np.array([42, 99]))
    assert list(st.ids) == [42, 99]


def test_n_seen_counts_all():
    st = make_state(mus=(100.0,), k=2)
    st.update(np.random.default_rng(2).normal(size=(50, 2)))
    assert st.n_seen == 50
    assert st.n_stored <= 2


def test_cap_must_be_positive():
    from repro.core.bank import CandidateBank

    with pytest.raises(ValueError):
        CandidateBank(3, 0)


def test_empty_guess_grid_rejected():
    with pytest.raises(ValueError):
        StreamState(MET, np.array([]), 2, 3)


# -- snapshot / prefilter ----------------------------------------------------

def _full_state_and_batch(seed=3, n_pre=150, n_batch=80):
    g = np.random.default_rng(seed)
    st = make_state(mus=(0.2, 0.4, 0.8, 1.6), k=4, caps={0: 2, 1: 2})
    Xp, gp = g.normal(size=(n_pre, 2)), g.integers(0, 2, n_pre)
    st.update(Xp, gp)
    Xb, gb = g.normal(size=(n_batch, 2)), g.integers(0, 2, n_batch)
    return st, Xb, gb


def test_prefilter_empty_state_keeps_all():
    st = make_state(caps={0: 1, 1: 1})
    keep = survives_snapshot(st.snapshot(), np.ones((5, 2)), np.zeros(5, dtype=int))
    assert keep.all()


def test_prefilter_is_superset_of_accepted():
    # every element the exact sequential update would store must survive
    st, Xb, gb = _full_state_and_batch()
    keep = survives_snapshot(st.snapshot(), Xb, gb)
    # continue the *same* state and record which batch rows get stored
    before = st.n_stored
    ids = np.arange(1000, 1000 + len(Xb))
    st.update(Xb, gb, ids=ids)
    accepted_ids = set(st.ids[before:].tolist())
    for r, eid in enumerate(ids.tolist()):
        if eid in accepted_ids:
            assert keep[r], f"row {r} accepted by exact update but prefiltered out"


def test_prefilter_drops_something_once_warm():
    st, Xb, gb = _full_state_and_batch()
    keep = survives_snapshot(st.snapshot(), Xb, gb)
    assert keep.sum() < len(Xb)  # warm state rejects most of a random batch


def test_snapshot_is_decoupled_from_state():
    st, Xb, gb = _full_state_and_batch()
    snap = st.snapshot()
    n0 = len(snap["feats"])
    st.update(Xb, gb)
    assert len(snap["feats"]) == n0
