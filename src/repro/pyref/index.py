"""The Num-based hierarchical index of Section V-C.

The index organises all vertices of the (preprocessed) multi-layer graph
into a disjoint partition ``I_1, ..., I_l`` where ``I_h`` holds the
vertices iteratively removed because their support ``Num(v)`` dropped to
``<= h``. Within a stage ``h``, vertices removed in the same batch share a
level; later batches sit on higher levels. Each vertex ``v`` carries
``L(v)``: the set of layers whose d-core contained ``v`` just before its
removal batch.

``RefineC`` uses the index through :meth:`NumIndex.scope` (Lemma 8):
``C^d_{L'} ⊆ U_{L'} ∩ ⋃_{h >= |L'|} I_h``. The level-by-level
early-termination scan of Fig. 10 is replaced by plain d-CC peeling on the
filtered scope — the output is identical (see DESIGN.md §2).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, FrozenSet, Iterable, List, Set

from .local_graph import LocalMLGraph
from .kernels import layer_cores, support


@dataclass
class NumIndex:
    """Hierarchical index over a multi-layer graph at degree threshold ``d``."""

    d: int
    n_layers: int
    stage_of: Dict[int, int] = field(default_factory=dict)  # v -> h with v in I_h
    level_of: Dict[int, int] = field(default_factory=dict)  # v -> global batch level
    layers_of: Dict[int, FrozenSet[int]] = field(default_factory=dict)  # L(v)
    stages: Dict[int, FrozenSet[int]] = field(default_factory=dict)  # h -> I_h

    @classmethod
    def build(cls, g: LocalMLGraph, d: int) -> "NumIndex":
        """Construct the index by staged batch removal on ``Num(v)``.

        For ``h = 1..l``: repeatedly compute the per-layer d-cores of the
        surviving graph, remove *as one batch* every vertex with
        ``Num(v) <= h``, until none qualifies; then advance ``h``. Every
        vertex is removed by stage ``l`` since ``Num(v) <= l`` always.
        """
        idx = cls(d=d, n_layers=g.n_layers)
        alive: Set[int] = set(g.vertices)
        level = 0
        for h in range(1, g.n_layers + 1):
            stage: Set[int] = set()
            while alive:
                cores = layer_cores(g, d, alive)
                batch = {v for v in alive if support(cores, v) <= h}
                if not batch:
                    break
                for v in batch:
                    idx.stage_of[v] = h
                    idx.level_of[v] = level
                    idx.layers_of[v] = frozenset(
                        i for i, c in cores.items() if v in c
                    )
                stage |= batch
                alive -= batch
                level += 1
            idx.stages[h] = frozenset(stage)
        return idx

    def scope(self, U: Iterable[int], L_prime: Iterable[int]) -> FrozenSet[int]:
        """Lemma 8 search-scope filter: ``U ∩ ⋃_{h >= |L'|} I_h``."""
        need = len(set(L_prime))
        return frozenset(v for v in U if self.stage_of.get(v, 0) >= need)
