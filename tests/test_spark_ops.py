"""Distributed operators (d-core, d-CC, components, preprocessing) vs pyref."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dcc import dcc_set
from repro.core.dcore import dcore, layer_cores, support_counts
from repro.core.graph import MultiLayerGraph
from repro.core.components import connected_components
from repro.core.preprocess import vertex_deletion
from repro.oracle import assert_equivalent
from repro.pyref import kernels as pk

from .util import random_mlg


@pytest.fixture(scope="module")
def gl():
    return random_mlg(45, 3, 0.1, 11)


@pytest.fixture(scope="module")
def gs(spark, gl):
    return MultiLayerGraph.from_local(spark, gl)


@pytest.mark.parametrize("d", [1, 2, 3])
def test_layer_cores_match_pyref(gs, gl, d):
    got = {}
    for r in layer_cores(gs, d).collect():
        got.setdefault(r.layer, set()).add(r.id)
    want = pk.layer_cores(gl, d)
    for i in gl.layers:
        assert got.get(i, set()) == set(want[i])


def test_layer_cores_d0_includes_isolated(gs, gl):
    got = layer_cores(gs, 0)
    assert got.count() == gl.n_layers * len(gl.vertices)


def test_layer_cores_within_restriction(gs, gl, spark):
    S = sorted(gl.vertices)[:25]
    w = spark.createDataFrame(pd.DataFrame({"id": S}))
    got = {}
    for r in layer_cores(gs, 2, within=w).collect():
        got.setdefault(r.layer, set()).add(r.id)
    want = pk.layer_cores(gl, 2, S)
    for i in gl.layers:
        assert got.get(i, set()) == set(want[i])


def test_layer_cores_warm_start_equivalent(gs, gl, spark):
    """Warm-starting from a superset of the cores changes nothing."""
    cold = layer_cores(gs, 2)
    warm = layer_cores(gs, 2, start_pairs=cold)
    a = {(r.layer, r.id) for r in cold.collect()}
    b = {(r.layer, r.id) for r in warm.collect()}
    assert a == b


@pytest.mark.parametrize("layer", [1, 2, 3])
def test_single_layer_dcore(gs, gl, layer):
    got = {r.id for r in dcore(gs, layer, 2).collect()}
    assert got == set(pk.dcore(gl, layer, 2))


def test_support_counts_oracle(gs, gl):
    cores = layer_cores(gs, 2)
    pdf = cores.toPandas()
    assert_equivalent(
        support_counts(cores),
        "SELECT id, COUNT(*) AS num FROM cores GROUP BY id",
        cores=pdf,
    )


@pytest.mark.parametrize("L", [[1], [1, 2], [1, 2, 3], [2, 3]])
def test_dcc_matches_pyref(gs, gl, L):
    assert dcc_set(gs, L, 2) == pk.dcc(gl, gl.vertices, L, 2)


def test_dcc_with_start_set(gs, gl):
    S = frozenset(sorted(gl.vertices)[:20])
    assert dcc_set(gs, [1, 2], 2, S) == pk.dcc(gl, S, [1, 2], 2)


def test_dcc_d0_and_empty_L(gs, gl):
    assert dcc_set(gs, [], 3) == gl.vertices
    assert dcc_set(gs, [1], 0) == gl.vertices


def test_dcc_empty_start(gs):
    assert dcc_set(gs, [1], 2, frozenset()) == frozenset()


@pytest.mark.parametrize("s", [1, 2, 3])
def test_vertex_deletion_matches_pyref(gs, gl, s):
    pre = vertex_deletion(gs, 2, s)
    surv_ref, cores_ref = pk.vertex_deletion(gl, 2, s)
    assert pre.survivors == surv_ref
    assert pre.cores_by_layer() == {i: frozenset(c) for i, c in cores_ref.items()}


def test_vertex_deletion_disabled(gs, gl):
    pre = vertex_deletion(gs, 2, 0)
    assert pre.survivors == gl.vertices


def test_connected_components_match_local(gs, gl):
    labels = {r.id: r.component for r in connected_components(gs).collect()}
    # reference: union-find over the union graph
    parent = {v: v for v in gl.vertices}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for _, u, v in gl.edges():
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    want = {v: find(v) for v in gl.vertices}
    assert labels == want


def test_connected_components_layer_restricted(gs, gl):
    labels = {r.id: r.component for r in connected_components(gs, layers=[1]).collect()}
    parent = {v: v for v in gl.vertices}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for layer, u, v in gl.edges():
        if layer != 1:
            continue
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    want = {v: find(v) for v in gl.vertices}
    assert labels == want
