"""Distributed connected components (min-label propagation).

Utility operator for reporting the component structure of discovered
d-CCs (a d-CC need not be connected; jobs report its components). The
iterative min-label propagation converges in O(diameter) DataFrame
rounds with checkpointed labels — adequate at this paper's scales and
expressed purely in Catalyst operators.
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .graph import MultiLayerGraph
from .dcore import _checkpoint


def connected_components(
    g: MultiLayerGraph, layers: Iterable[int] | None = None
) -> DataFrame:
    """``(id, component)`` where ``component`` is the min vertex id reachable.

    ``layers`` restricts the edge set (default: union over all layers).
    Isolated vertices form singleton components.
    """
    adj = g.sym(layers).select("src", "dst").distinct().cache()
    labels = _checkpoint(
        g.vertices.select("id", F.col("id").alias("component"))
    )
    while True:
        msgs = adj.join(
            labels.withColumnRenamed("id", "src"), "src"
        ).select(F.col("dst").alias("id"), "component")
        new_labels = (
            labels.unionByName(msgs)
            .groupBy("id")
            .agg(F.min("component").alias("component"))
        )
        new_labels = _checkpoint(new_labels)
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "id")
            .filter(F.col("n.component") != F.col("o.component"))
            .count()
        )
        labels = new_labels
        if changed == 0:
            adj.unpersist()
            return labels
