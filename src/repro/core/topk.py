"""Temporary top-k diversified d-CC maintenance (Section IV-A, Appendix C).

Maintains the result set ``R`` under the two update rules:

* **Rule 1** — while ``|R| < k``, every candidate is inserted.
* **Rule 2** — at ``|R| = k``, candidate ``C`` replaces the entry
  ``C*(R)`` that exclusively covers the fewest vertices iff Eq. (1)
  holds: ``|Cov((R − {C*}) ∪ {C})| >= (1 + 1/k)·|Cov(R)|``.

Bookkeeping follows Appendix C: the vertex→owners map ``M`` gives
``|Cov(R)| = len(M)`` and incremental ``Δ(R, C')`` (exclusive-cover)
counters. We find ``C*`` by an ``O(k)`` scan of the ``Δ`` values instead
of the paper's bucket hash ``H`` — identical semantics, and ``k <= 25``
throughout the evaluation. Entries are keyed by insertion id so equal
vertex sets arising from different layer sets stay distinct.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, FrozenSet, List, Optional, Sequence, Set, Tuple

LayerSet = Tuple[int, ...]


@dataclass
class Entry:
    """One member of ``R``: its vertex set and the layer set it came from."""

    eid: int
    layers: LayerSet
    vertices: FrozenSet[int]


@dataclass
class TopKDiversified:
    """The paper's `Update` procedure with incremental Δ bookkeeping."""

    k: int
    entries: Dict[int, Entry] = field(default_factory=dict)
    _owners: Dict[int, Set[int]] = field(default_factory=dict)  # M: v -> {eid}
    _delta: Dict[int, int] = field(default_factory=dict)  # eid -> |Δ(R, C)|
    _next_id: int = 0
    n_updates_applied: int = 0
    n_updates_tried: int = 0

    # -- queries ---------------------------------------------------------

    @property
    def size(self) -> int:
        return len(self.entries)

    @property
    def cov_size(self) -> int:
        """``|Cov(R)|`` — number of distinct covered vertices."""
        return len(self._owners)

    def cover(self) -> FrozenSet[int]:
        return frozenset(self._owners)

    def results(self) -> List[Entry]:
        """Entries in insertion order (stable across engines)."""
        return [self.entries[eid] for eid in sorted(self.entries)]

    def worst(self) -> Optional[Entry]:
        """``C*(R)``: entry with minimum exclusive cover (lowest id on ties)."""
        if not self.entries:
            return None
        star = min(self.entries, key=lambda eid: (self._delta[eid], eid))
        return self.entries[star]

    @property
    def delta_min(self) -> int:
        """``|Δ(R, C*(R))|``; 0 when ``R`` is empty."""
        w = self.worst()
        return self._delta[w.eid] if w else 0

    # -- Eq. (1) / Eq. (2) machinery ------------------------------------

    def replacement_cover_size(self, C: FrozenSet[int]) -> int:
        """Appendix C `Size`: ``|Cov((R − {C*(R)}) ∪ {C})|``."""
        star = self.worst()
        assert star is not None
        c = 0
        star_set = star.vertices
        for v in C:
            owners = self._owners.get(v)
            if owners is None:
                c += 1  # v ∈ C − Cov(R)
            elif v in star_set and len(owners) == 1:
                c += 1  # v ∈ C ∩ Δ(R, C*)
        return c + self.cov_size - self._delta[star.eid]

    def eq1_threshold(self) -> float:
        """Right-hand side of Eq. (1): ``(1 + 1/k)·|Cov(R)|``."""
        return (1.0 + 1.0 / self.k) * self.cov_size

    def satisfies_eq1(self, C: FrozenSet[int]) -> bool:
        """Whether replacing ``C*`` with ``C`` meets Eq. (1). |R| = k only."""
        return self.replacement_cover_size(C) >= self.eq1_threshold()

    def order_prune_threshold(self) -> float:
        """Lemmas 3/6 bound: ``|Cov(R)|/k + |Δ(R, C*(R))|``."""
        return self.cov_size / self.k + self.delta_min

    def satisfies_eq2(self, U: FrozenSet[int]) -> bool:
        """Eq. (2) on a potential set ``U`` (Lemma 7 shortcut)."""
        k = self.k
        return len(U) < (1.0 / k + 1.0 / k**2) * self.cov_size + (
            1.0 + 1.0 / k
        ) * self.delta_min

    # -- mutation --------------------------------------------------------

    def update(self, C: FrozenSet[int], layers: Sequence[int]) -> bool:
        """Try to update ``R`` with candidate ``C`` (Rules 1–2); True if applied."""
        self.n_updates_tried += 1
        if len(self.entries) < self.k:
            self._insert(C, tuple(layers))
            self.n_updates_applied += 1
            return True
        if self.satisfies_eq1(C):
            self._delete(self.worst().eid)
            self._insert(C, tuple(layers))
            self.n_updates_applied += 1
            return True
        return False

    def _insert(self, C: FrozenSet[int], layers: LayerSet) -> None:
        eid = self._next_id
        self._next_id += 1
        self.entries[eid] = Entry(eid=eid, layers=layers, vertices=C)
        delta = 0
        for v in C:
            owners = self._owners.get(v)
            if owners is None:
                self._owners[v] = {eid}
                delta += 1
            else:
                if len(owners) == 1:
                    (only,) = owners
                    self._delta[only] -= 1
                owners.add(eid)
        self._delta[eid] = delta

    def _delete(self, eid: int) -> None:
        entry = self.entries.pop(eid)
        del self._delta[eid]
        for v in entry.vertices:
            owners = self._owners[v]
            owners.discard(eid)
            if len(owners) == 1:
                (only,) = owners
                self._delta[only] += 1
            elif not owners:
                del self._owners[v]
