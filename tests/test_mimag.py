"""MiMAG-lite baseline: predicate exactness, mining soundness, diversification."""
import math

import pytest

from repro.baseline import mimag, mine_quasi_cliques, quasi_clique_layers
from repro.pyref.local_graph import LocalMLGraph

from .util import random_mlg


def clique_graph(n, layers):
    return LocalMLGraph.from_edges(
        [(i, u, v) for i in layers for u in range(1, n + 1) for v in range(u + 1, n + 1)],
        n_layers=max(layers),
    )


def test_quasi_clique_predicate_on_clique():
    g = clique_graph(5, [1, 2])
    assert quasi_clique_layers(g, set(range(1, 6)), 1.0) == frozenset({1, 2})


def test_quasi_clique_predicate_partial():
    # path 1-2-3: each endpoint has degree 1; γ(|Q|−1) = ceil(0.5*2) = 1 → ok
    g = LocalMLGraph.from_edges([(1, 1, 2), (1, 2, 3)], n_layers=1)
    assert quasi_clique_layers(g, {1, 2, 3}, 0.5) == frozenset({1})
    assert quasi_clique_layers(g, {1, 2, 3}, 0.8) == frozenset()


def test_quasi_clique_singleton_supports_all_layers():
    g = clique_graph(3, [1, 2])
    assert quasi_clique_layers(g, {1}, 0.8) == frozenset({1, 2})


@pytest.mark.parametrize("seed", range(4))
def test_mined_clusters_verify_exact_predicate(seed):
    g = random_mlg(20, 3, 0.2, seed)
    res = mine_quasi_cliques(g, gamma=0.8, min_size=3, s=2)
    for c in res.all_quasi_cliques:
        assert len(c.vertices) >= 3
        need = math.ceil(0.8 * (len(c.vertices) - 1))
        layers_ok = quasi_clique_layers(g, set(c.vertices), 0.8)
        assert c.layers == layers_ok
        assert len(c.layers) >= 2
        for i in c.layers:
            for v in c.vertices:
                assert g.degree(i, v, within=c.vertices) >= need


def test_finds_planted_clique():
    g = clique_graph(6, [1, 2, 3])
    res = mine_quasi_cliques(g, gamma=1.0, min_size=3, s=3)
    assert frozenset(range(1, 7)) in {c.vertices for c in res.all_quasi_cliques}


def test_maximality_filter():
    g = clique_graph(6, [1, 2])
    res = mine_quasi_cliques(g, gamma=1.0, min_size=3, s=2)
    full = frozenset(range(1, 7))
    for c in res.all_quasi_cliques:
        if c.vertices != full:
            # any strict subset kept must not be dominated at equal support
            assert not (c.vertices < full and c.layers <= frozenset({1, 2}))
    assert full in {c.vertices for c in res.all_quasi_cliques}


def test_support_threshold_respected():
    # clique on layer 1 only; s=2 must yield nothing
    g = clique_graph(5, [1])
    g = LocalMLGraph.from_edges(g.edges(), n_layers=2, vertices=g.vertices)
    res = mine_quasi_cliques(g, gamma=0.9, min_size=3, s=2)
    assert res.all_quasi_cliques == []


def test_diversify_redundancy_filter():
    g = clique_graph(8, [1, 2])
    res = mimag(g, gamma=1.0, min_size=3, s=2, redundancy=0.25)
    covered = set()
    for c in res.clusters:
        assert len(c.vertices & covered) / len(c.vertices) <= 0.25
        covered |= c.vertices


def test_node_budget_marks_exhaustion():
    g = random_mlg(30, 2, 0.3, 0)
    res = mine_quasi_cliques(g, gamma=0.6, min_size=3, s=1, node_budget=50)
    assert res.budget_exhausted
    assert res.nodes_explored >= 50


def test_max_size_cap():
    g = clique_graph(8, [1, 2])
    res = mine_quasi_cliques(g, gamma=1.0, min_size=3, s=2, max_size=4)
    assert all(len(c.vertices) <= 4 for c in res.all_quasi_cliques)


def test_determinism():
    g = random_mlg(18, 2, 0.25, 1)
    r1 = mimag(g, gamma=0.8, min_size=3, s=1)
    r2 = mimag(g, gamma=0.8, min_size=3, s=1)
    assert [c.vertices for c in r1.clusters] == [c.vertices for c in r2.clusters]
