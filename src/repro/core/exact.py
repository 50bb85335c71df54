"""Brute-force exact DCCS for tiny instances (approximation-ratio tests).

The paper deliberately omits this ("cannot terminate in reasonable time");
we include it only to *verify* the approximation guarantees on graphs
small enough that ``C(|F|, k)`` is enumerable.
"""
from __future__ import annotations

from itertools import combinations
from typing import FrozenSet, List, Sequence, Set, Tuple

from .engine import DCCSContext
from .greedy import enumerate_candidates


def exact_max_k_cover(
    candidates: Sequence[Tuple[Tuple[int, ...], FrozenSet[int]]],
    k: int,
    *,
    max_combinations: int = 2_000_000,
) -> Tuple[List[Tuple[Tuple[int, ...], FrozenSet[int]]], int]:
    """Optimal k-subset of ``candidates`` by exhaustive enumeration.

    Returns (chosen, |Cov|). Raises if the enumeration would exceed
    ``max_combinations`` (guard against accidental blow-up in tests).
    """
    n = len(candidates)
    k = min(k, n)
    from math import comb

    if comb(n, k) > max_combinations:
        raise ValueError(f"C({n},{k}) too large for exact enumeration")
    best: List[Tuple[Tuple[int, ...], FrozenSet[int]]] = []
    best_cov = -1
    for combo in combinations(range(n), k):
        cov: Set[int] = set()
        for i in combo:
            cov |= candidates[i][1]
        if len(cov) > best_cov:
            best_cov = len(cov)
            best = [candidates[i] for i in combo]
    return best, max(best_cov, 0)


def exact_dccs(ctx: DCCSContext, k: int) -> Tuple[List[Tuple[Tuple[int, ...], FrozenSet[int]]], int]:
    """Exact optimum of the DCCS instance (tiny graphs only)."""
    return exact_max_k_cover(enumerate_candidates(ctx), k)
