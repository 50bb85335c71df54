"""Top-k maintenance (Update/Size/Δ bookkeeping) vs. a naive reference."""
import random
from typing import List, Set

import pytest
from hypothesis import given, settings, strategies as st

from repro.core.topk import TopKDiversified


class NaiveTopK:
    """Straight-from-the-paper recomputation of the Update rules."""

    def __init__(self, k: int):
        self.k = k
        self.R: List[frozenset] = []

    def cov(self, sets=None) -> Set[int]:
        out: Set[int] = set()
        for c in self.R if sets is None else sets:
            out |= c
        return out

    def delta(self, idx: int) -> Set[int]:
        others = self.cov([c for i, c in enumerate(self.R) if i != idx])
        return set(self.R[idx]) - others

    def star(self) -> int:
        return min(range(len(self.R)), key=lambda i: (len(self.delta(i)), i))

    def update(self, C: frozenset) -> bool:
        if len(self.R) < self.k:
            self.R.append(C)
            return True
        star = self.star()
        new_cov = self.cov([c for i, c in enumerate(self.R) if i != star] + [C])
        if len(new_cov) >= (1 + 1 / self.k) * len(self.cov()):
            self.R[star] = C  # replace, order-preserving on index
            # keep insertion-order semantics comparable: move to end
            self.R.append(self.R.pop(star))
            return True
        return False


def random_sets(seed: int, n: int, universe: int, max_size: int):
    rng = random.Random(seed)
    return [
        frozenset(rng.sample(range(universe), rng.randint(0, max_size)))
        for _ in range(n)
    ]


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("k", [1, 2, 3, 5])
def test_update_matches_naive(seed, k):
    topk = TopKDiversified(k=k)
    naive = NaiveTopK(k)
    for C in random_sets(seed, 40, 30, 12):
        applied = topk.update(C, (1,))
        applied_naive = naive.update(C)
        assert applied == applied_naive
        assert topk.cov_size == len(naive.cov())
        assert topk.cover() == frozenset(naive.cov())


@pytest.mark.parametrize("seed", range(10))
def test_delta_bookkeeping_invariant(seed):
    """Incremental Δ values always equal recomputed exclusive covers."""
    topk = TopKDiversified(k=3)
    for C in random_sets(seed, 30, 25, 10):
        topk.update(C, (1,))
        entries = topk.results()
        for e in entries:
            others = set()
            for o in entries:
                if o.eid != e.eid:
                    others |= o.vertices
            assert topk._delta[e.eid] == len(e.vertices - others)


def test_rule1_fills_to_k():
    topk = TopKDiversified(k=3)
    for i in range(3):
        assert topk.update(frozenset({i}), (i,))
    assert topk.size == 3
    assert topk.cov_size == 3


def test_rule2_requires_eq1_gain():
    topk = TopKDiversified(k=2)
    topk.update(frozenset({1, 2, 3}), (1,))
    topk.update(frozenset({4, 5, 6}), (2,))
    # cov = 6; need >= (1 + 1/2)*6 = 9 after replacement — impossible here
    assert not topk.update(frozenset({7, 8}), (3,))
    # big candidate: replacing worst gives {4,5,6} ∪ {7..12} = 9 >= 9
    assert topk.update(frozenset({7, 8, 9, 10, 11, 12}), (3,))
    assert 7 in topk.cover()


def test_worst_breaks_ties_by_id():
    topk = TopKDiversified(k=2)
    topk.update(frozenset({1}), (1,))
    topk.update(frozenset({2}), (2,))
    assert topk.worst().eid == 0


def test_replacement_cover_size_formula():
    topk = TopKDiversified(k=2)
    topk.update(frozenset({1, 2}), (1,))
    topk.update(frozenset({2, 3, 4}), (2,))
    # worst = entry0 (Δ={1}); replace with {5}: cov({2,3,4}) ∪ {5} = 4
    assert topk.replacement_cover_size(frozenset({5})) == 4
    # replace with {1}: {2,3,4} ∪ {1} = 4
    assert topk.replacement_cover_size(frozenset({1})) == 4
    # replace with {2}: {2,3,4} = 3
    assert topk.replacement_cover_size(frozenset({2})) == 3


def test_duplicate_sets_allowed():
    topk = TopKDiversified(k=2)
    C = frozenset({1, 2})
    topk.update(C, (1,))
    topk.update(C, (2,))
    assert topk.size == 2
    assert topk.cov_size == 2
    assert topk.delta_min == 0  # neither covers anything exclusively


def test_empty_candidate():
    topk = TopKDiversified(k=2)
    topk.update(frozenset(), (1,))
    assert topk.size == 1
    assert topk.cov_size == 0


@given(st.integers(0, 10_000))
@settings(max_examples=40, deadline=None)
def test_update_matches_naive_hypothesis(seed):
    topk = TopKDiversified(k=3)
    naive = NaiveTopK(3)
    for C in random_sets(seed, 25, 20, 8):
        assert topk.update(C, (1,)) == naive.update(C)
        assert topk.cover() == frozenset(naive.cov())
