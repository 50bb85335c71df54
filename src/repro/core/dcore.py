"""Distributed d-core decomposition by iterative batch peeling.

Each peeling round removes *every* currently-violating vertex (degree
``< d``) at once — the DataFrame analogue of the bin-array peeling of
Batagelj & Zaversnik used by the paper's `dCC` (Appendix B). Batch
removal converges in a number of rounds bounded by the degeneracy-ordering
depth, which is small in practice. ``localCheckpoint`` truncates lineage
every round so Catalyst plans stay constant-size.

`layer_cores` peels **all layers simultaneously** in one DataFrame loop
(a vertex is removed per-layer), which is how the vertex-deletion
preprocessing obtains every ``C^d(G_i)`` with a single iterative job
instead of ``l`` separate ones.
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .graph import MultiLayerGraph


def _checkpoint(df: DataFrame) -> DataFrame:
    """Materialise and cut lineage (eager local checkpoint)."""
    return df.localCheckpoint(eager=True)


def layer_cores(
    g: MultiLayerGraph,
    d: int,
    within: DataFrame | None = None,
    start_pairs: DataFrame | None = None,
) -> DataFrame:
    """``(layer, id)`` membership of the d-core of every layer.

    ``within`` optionally restricts all layers to a vertex subset
    (column ``id``), i.e. computes the cores of ``G[within]``.
    ``start_pairs`` optionally warm-starts the peel from a known
    over-approximation of the cores (``(layer, id)`` pairs) — used by the
    vertex-deletion fixpoint, whose per-layer cores only shrink across
    outer iterations.
    """
    sym = g.sym()
    if within is not None:
        w = within.select("id").distinct()
        sym = sym.join(w.withColumnRenamed("id", "src"), "src", "semi").join(
            w.withColumnRenamed("id", "dst"), "dst", "semi"
        )
    sym = sym.select("layer", "src", "dst").cache()
    if d <= 0:
        # C^0(G_i) is the whole vertex set on every layer.
        verts = within if within is not None else g.vertices
        layers_df = g.spark.range(1, g.n_layers + 1).select(
            F.col("id").cast("int").alias("layer")
        )
        return layers_df.crossJoin(verts.select("id"))
    if start_pairs is not None:
        alive = _checkpoint(start_pairs.select("layer", "id"))
    else:
        alive = _checkpoint(
            sym.select("layer", F.col("src").alias("id")).distinct()
        )
    n_alive = alive.count()
    while True:
        adj = sym.join(
            alive.select("layer", F.col("id").alias("src")), ["layer", "src"], "semi"
        ).join(
            alive.select("layer", F.col("id").alias("dst")), ["layer", "dst"], "semi"
        )
        good = (
            adj.groupBy("layer", "src")
            .agg(F.count("*").alias("deg"))
            .filter(F.col("deg") >= d)
            .select("layer", F.col("src").alias("id"))
        )
        good = _checkpoint(good)
        n_good = good.count()
        if n_good == n_alive:
            sym.unpersist()
            return good
        alive, n_alive = good, n_good


def dcore(g: MultiLayerGraph, layer: int, d: int) -> DataFrame:
    """Single-layer d-core ``C^d(G_layer)`` as an ``(id)`` DataFrame."""
    sub = MultiLayerGraph(
        spark=g.spark,
        edges=g.edges.filter(F.col("layer") == layer),
        vertices=g.vertices,
        n_layers=g.n_layers,
    )
    return layer_cores(sub, d).select("id")


def support_counts(cores: DataFrame) -> DataFrame:
    """``Num(v)``: layers whose d-core contains ``v`` — ``(id, num)``."""
    return cores.groupBy("id").agg(F.count("*").alias("num"))
