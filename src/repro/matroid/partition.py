"""Partition matroid over a labelled ground set.

Both matroids in SFDM2's post-processing are partition matroids:

* the **fairness matroid** ``M1``: labels = group ids, caps = the quotas k_i;
* the **cluster matroid** ``M2``: labels = cluster ids, caps = 1 everywhere.
"""
from __future__ import annotations

import numpy as np


class PartitionMatroid:
    """``S`` is independent iff ``|S ∩ {x: label(x)=l}| <= cap(l)`` for all l."""

    def __init__(self, labels: np.ndarray, caps: dict[int, int] | int):
        self.labels = np.asarray(labels, dtype=np.int64)
        if isinstance(caps, int):
            self.caps = {int(l): caps for l in np.unique(self.labels)}
        else:
            self.caps = {int(l): int(c) for l, c in caps.items()}

    def cap(self, label: int) -> int:
        return self.caps.get(int(label), 0)

    def is_independent(self, members: np.ndarray) -> bool:
        labels, counts = np.unique(self.labels[members], return_counts=True)
        return all(c <= self.cap(l) for l, c in zip(labels, counts))

    def label_counts(self, members) -> dict[int, int]:
        labels, counts = np.unique(self.labels[list(members)], return_counts=True)
        return {int(l): int(c) for l, c in zip(labels, counts)}

    def can_add(self, counts: dict[int, int], x: int) -> bool:
        """Whether adding element ``x`` keeps independence, given label counts."""
        l = int(self.labels[x])
        return counts.get(l, 0) < self.cap(l)

    def rank(self) -> int:
        labels, counts = np.unique(self.labels, return_counts=True)
        return int(sum(min(c, self.cap(l)) for l, c in zip(labels, counts)))
