"""Vectorized per-guess candidate maintenance (the stream phase of Alg. 1-3).

One :class:`StreamState` holds

* a bounded **element store** — features/group/id of every element accepted by
  at least one candidate (the paper's ``O(km logΔ/ε)`` memory bound), and
* one or more :class:`CandidateBank` s — for each guess ``μ`` in the grid, a
  candidate subset of the store, represented as a ``(G, store)`` boolean
  membership matrix so a single masked-min evaluates ``d(x, S_μ)`` for every
  guess at once.

The update rule per element x (Algorithm 1, line 5): for each guess μ with
``|S_μ| < cap`` and ``d(x, S_μ) >= μ``, add x to ``S_μ``. Acceptance is
evaluated against the *blind* bank and the bank of x's own group only, exactly
as in Algorithms 2/3.
"""
from __future__ import annotations

import numpy as np

from ..metrics import Metric

__all__ = ["CandidateBank", "StreamState"]


class CandidateBank:
    """G candidates (one per guess) over a shared element store."""

    def __init__(self, n_guesses: int, cap: int, store_capacity: int = 64):
        if cap < 1:
            raise ValueError("cap must be >= 1")
        self.cap = cap
        self.member = np.zeros((n_guesses, store_capacity), dtype=bool)
        self.sizes = np.zeros(n_guesses, dtype=np.int64)

    def grow(self, new_capacity: int) -> None:
        g, old = self.member.shape
        if new_capacity <= old:
            return
        m = np.zeros((g, new_capacity), dtype=bool)
        m[:, :old] = self.member
        self.member = m

    def accept_mask(self, dists: np.ndarray, mus: np.ndarray, n_stored: int) -> np.ndarray:
        """Which guesses accept an element at distance vector ``dists``.

        ``d(x, ∅) = ∞`` so an empty candidate accepts at every guess.
        """
        nonfull = self.sizes < self.cap
        out = np.zeros(len(mus), dtype=bool)
        if not nonfull.any():
            return out
        if n_stored == 0:
            out[:] = nonfull
            return out
        M = self.member[nonfull, :n_stored]
        dmin = np.where(M, dists[None, :n_stored], np.inf).min(axis=1)
        out[nonfull] = dmin >= mus[nonfull]
        return out

    def indices(self, guess: int, n_stored: int) -> np.ndarray:
        """Store indices of candidate ``S_μ`` for guess index ``guess``."""
        return np.flatnonzero(self.member[guess, :n_stored])


class StreamState:
    """Element store + blind/group candidate banks; strictly sequential update."""

    def __init__(
        self,
        metric: Metric,
        mus: np.ndarray,
        dim: int,
        k: int,
        group_caps: dict[int, int] | None = None,
    ):
        self.metric = metric
        self.mus = np.asarray(mus, dtype=np.float64)
        if len(self.mus) == 0:
            raise ValueError("empty guess grid")
        self.dim = dim
        self.k = k
        g = len(self.mus)
        self.blind = CandidateBank(g, k)
        self.group_banks: dict[int, CandidateBank] = {}
        if group_caps is not None:
            for grp, cap in group_caps.items():
                self.group_banks[int(grp)] = CandidateBank(g, cap)
        cap0 = 64
        self._feats = np.zeros((cap0, dim), dtype=np.float64)
        self._groups = np.zeros(cap0, dtype=np.int64)
        self._ids = np.zeros(cap0, dtype=np.int64)
        self.n_stored = 0
        self.n_seen = 0

    # -- store access -------------------------------------------------------
    @property
    def feats(self) -> np.ndarray:
        return self._feats[: self.n_stored]

    @property
    def groups(self) -> np.ndarray:
        return self._groups[: self.n_stored]

    @property
    def ids(self) -> np.ndarray:
        return self._ids[: self.n_stored]

    def _append(self, x: np.ndarray, group: int, eid: int) -> int:
        if self.n_stored == len(self._feats):
            new_cap = 2 * len(self._feats)
            self._feats = np.resize(self._feats, (new_cap, self.dim))
            self._groups = np.resize(self._groups, new_cap)
            self._ids = np.resize(self._ids, new_cap)
            self.blind.grow(new_cap)
            for b in self.group_banks.values():
                b.grow(new_cap)
        j = self.n_stored
        self._feats[j] = x
        self._groups[j] = group
        self._ids[j] = eid
        self.n_stored += 1
        return j

    # -- stream update ------------------------------------------------------
    def update(
        self,
        feats: np.ndarray,
        groups: np.ndarray | None = None,
        ids: np.ndarray | None = None,
    ) -> None:
        """Process a chunk of the stream in order (chunking never changes state)."""
        feats = np.atleast_2d(np.asarray(feats, dtype=np.float64))
        b = len(feats)
        if groups is None:
            groups = np.zeros(b, dtype=np.int64)
        groups = np.asarray(groups, dtype=np.int64)
        if ids is None:
            ids = np.arange(self.n_seen, self.n_seen + b, dtype=np.int64)
        ids = np.asarray(ids, dtype=np.int64)
        mus = self.mus
        for r in range(b):
            x, grp, eid = feats[r], int(groups[r]), int(ids[r])
            dists = self.metric.point_to_rows(x, self._feats[: self.n_stored])
            acc_b = self.blind.accept_mask(dists, mus, self.n_stored)
            gb = self.group_banks.get(grp)
            acc_g = gb.accept_mask(dists, mus, self.n_stored) if gb is not None else None
            took_b = bool(acc_b.any())
            took_g = acc_g is not None and bool(acc_g.any())
            if took_b or took_g:
                j = self._append(x, grp, eid)
                if took_b:
                    self.blind.member[acc_b, j] = True
                    self.blind.sizes[acc_b] += 1
                if took_g:
                    gb.member[acc_g, j] = True
                    gb.sizes[acc_g] += 1
            self.n_seen += 1

    # -- distributed prefilter ----------------------------------------------
    def snapshot(self) -> dict:
        """Immutable state snapshot for broadcasting to executors."""
        banks = {
            int(g): (b.member[:, : self.n_stored].copy(), b.sizes.copy(), b.cap)
            for g, b in self.group_banks.items()
        }
        return {
            "metric": self.metric.name,
            "mus": self.mus.copy(),
            "feats": self.feats.copy(),
            "blind": (
                self.blind.member[:, : self.n_stored].copy(),
                self.blind.sizes.copy(),
                self.blind.cap,
            ),
            "banks": banks,
        }


def survives_snapshot(
    snap: dict, feats: np.ndarray, groups: np.ndarray
) -> np.ndarray:
    """Vectorized prefilter: True where an element *might* still be accepted.

    Evaluated against a state snapshot. Safe to drop False rows: candidates
    only grow and ``d(x,S)`` only shrinks, so rejection against an older state
    implies rejection against every later state (see DESIGN.md §3).
    """
    from ..metrics import get_metric

    metric = get_metric(snap["metric"])
    mus = snap["mus"]
    feats = np.asarray(feats, dtype=np.float64)
    groups = np.asarray(groups, dtype=np.int64)
    n_b = len(feats)
    store = snap["feats"]
    if len(store) == 0:
        return np.ones(n_b, dtype=bool)
    D = metric.pairwise(feats, store)  # (B, N)
    out = np.zeros(n_b, dtype=bool)

    def _bank_pass(member: np.ndarray, sizes: np.ndarray, cap: int, rows: np.ndarray):
        for g in np.flatnonzero(sizes < cap):
            idx = np.flatnonzero(member[g])
            if idx.size == 0:
                out[rows] = True
                continue
            live = rows[~out[rows]]
            if live.size == 0:
                return
            ok = D[np.ix_(live, idx)].min(axis=1) >= mus[g]
            out[live[ok]] = True

    all_rows = np.arange(n_b)
    member, sizes, cap = snap["blind"]
    _bank_pass(member, sizes, cap, all_rows)
    for grp, (member, sizes, cap) in snap["banks"].items():
        rows = np.flatnonzero(groups == grp)
        if rows.size:
            _bank_pass(member, sizes, cap, rows)
    return out
