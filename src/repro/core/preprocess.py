"""Distributed vertex-deletion preprocessing (BU-DCCS lines 1–7).

Fixpoint: compute all per-layer d-cores (one simultaneous peeling job),
derive the support ``Num(v)``, delete every vertex supported by fewer
than ``s`` layers, repeat until stable. By Lemma 1 this never removes a
vertex of any candidate d-CC with ``|L| = s``, and it is the phase where
distributed execution pays off — the search algorithms then run on the
pruned remainder.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, FrozenSet

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .graph import MultiLayerGraph
from .dcore import _checkpoint, layer_cores, support_counts


@dataclass(frozen=True)
class Preprocessed:
    """Result of the vertex-deletion fixpoint."""

    graph: MultiLayerGraph  # induced on surviving vertices
    cores: DataFrame  # (layer, id): per-layer d-cores of the pruned graph
    num: DataFrame  # (id, num): support of survivors
    survivors: FrozenSet[int]

    def cores_by_layer(self) -> Dict[int, FrozenSet[int]]:
        """Collect the per-layer cores to driver-side sets."""
        out: Dict[int, FrozenSet[int]] = {}
        pdf = self.cores.toPandas()
        for layer, grp in pdf.groupby("layer"):
            out[int(layer)] = frozenset(int(v) for v in grp["id"])
        for i in range(1, self.graph.n_layers + 1):
            out.setdefault(i, frozenset())
        return out


def vertex_deletion(g: MultiLayerGraph, d: int, s: int) -> Preprocessed:
    """Run the fixpoint and return the pruned graph plus core/support tables.

    ``s <= 0`` disables deletion (the "No-VD" ablation): cores are still
    computed — the algorithms need them — but no vertex is removed.
    """
    if s <= 0:
        cores = _checkpoint(layer_cores(g, d))
        return Preprocessed(
            graph=g,
            cores=cores,
            num=support_counts(cores),
            survivors=frozenset(int(r.id) for r in g.vertices.collect()),
        )
    alive = _checkpoint(g.vertices.select("id"))
    n_alive = alive.count()
    prev_cores: DataFrame | None = None
    while True:
        if prev_cores is None:
            cores = layer_cores(g, d, within=alive)
        else:
            # Warm start: cores only shrink across outer iterations, so the
            # previous cores restricted to the surviving vertices are a valid
            # starting over-approximation (saves full re-peels).
            cores = layer_cores(
                g,
                d,
                start_pairs=prev_cores.join(alive, "id", "semi"),
            )
        cores = _checkpoint(cores)
        prev_cores = cores
        num = support_counts(cores)
        keep = num.filter(F.col("num") >= s).select("id")
        keep = _checkpoint(keep)
        n_keep = keep.count()
        if n_keep == n_alive:
            pruned = g.induced(keep)
            survivors = frozenset(int(r.id) for r in keep.collect())
            return Preprocessed(
                graph=pruned,
                cores=cores,
                num=num.filter(F.col("num") >= s),
                survivors=survivors,
            )
        alive, n_alive = keep, n_keep
