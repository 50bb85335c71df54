"""BU-DCCS — bottom-up search algorithm (Section IV, Figs. 3 & 7).

Candidate d-CCs are organised in a set-enumeration tree over layer
subsets; generation and top-k maintenance interleave so that Eq. (1)
failures prune whole subtrees (Lemma 2), the intersection-size order
admits early loop exit (Lemma 3), and pruned expansion layers are banned
for all descendants (Lemma 4). Preprocessing: vertex deletion (in the
context builder), layer sorting, and greedy InitTopK. 1/4-approximate
(Theorem 3).

The tree operates on layer *positions* of the sorted layer order; the
``order`` list maps positions back to actual layer numbers for kernel
calls and reported layer sets.
"""
from __future__ import annotations

import time
from typing import Dict, FrozenSet, List, Sequence, Tuple

from .engine import DCCSContext
from .result import DCCSResult, from_topk, init_topk
from .topk import TopKDiversified


def _layer_order(ctx: DCCSContext, enabled: bool, *, descending: bool) -> List[int]:
    """Sorted-layers preprocessing: position -> actual layer number."""
    layers = list(range(1, ctx.n_layers + 1))
    if not enabled:
        return layers
    sign = -1 if descending else 1
    return sorted(layers, key=lambda i: (sign * len(ctx.cores[i]), i))


def bu_dccs(
    ctx: DCCSContext,
    k: int,
    *,
    sort_layers: bool = True,
    init_result: bool = True,
) -> DCCSResult:
    """Run BU-DCCS; flags disable preprocessing steps for the Fig. 28 ablation."""
    t0 = time.perf_counter()
    ctx.n_dcc_calls = 0
    l, s = ctx.n_layers, ctx.s
    order = _layer_order(ctx, sort_layers, descending=True)
    core_at = {p: ctx.cores[order[p - 1]] for p in range(1, l + 1)}

    topk = init_topk(ctx, k) if init_result else TopKDiversified(k=k)
    n_candidates = 0

    def actual(L_pos: Sequence[int]) -> List[int]:
        return sorted(order[p - 1] for p in L_pos)

    def bu_gen(
        L_pos: Tuple[int, ...], C_L: FrozenSet[int], L_Q: FrozenSet[int]
    ) -> None:
        nonlocal n_candidates
        max_l = L_pos[-1] if L_pos else 0
        L_P = [p for p in range(max_l + 1, l + 1) if p not in L_Q]
        if not L_P:
            return
        sorted_desc = topk.size == k
        if sorted_desc:
            # Lemma 3 needs descending |C_L ∩ C^d(G_j)| order for `break`.
            L_P.sort(key=lambda p: (-len(C_L & core_at[p]), p))
        L_R: List[int] = []
        children: Dict[int, FrozenSet[int]] = {}
        for p in L_P:
            bound = C_L & core_at[p]
            if topk.size == k and len(bound) < topk.order_prune_threshold():
                if sorted_desc:
                    break  # Lemma 3: this child and all successors are hopeless
                continue  # unsorted (k reached mid-loop): skip this child only
            L_new = L_pos + (p,)
            if len(L_new) == 1:
                C_new = core_at[p]  # C^d_{{i}} = C^d(G_i), precomputed
            else:
                C_new = ctx.run_dcc(bound, actual(L_new))
            if len(L_new) == s:
                n_candidates += 1
                topk.update(C_new, actual(L_new))
            elif topk.size < k:
                L_R.append(p)
                children[p] = C_new
            elif topk.satisfies_eq1(C_new):  # Lemma 2 gate
                L_R.append(p)
                children[p] = C_new
        if len(L_pos) + 1 < s:
            banned = L_Q | (frozenset(L_P) - frozenset(L_R))  # Lemma 4
            for p in L_R:
                bu_gen(L_pos + (p,), children[p], banned)

    if s <= l:
        bu_gen((), ctx.vertices, frozenset())
    seconds = time.perf_counter() - t0 + ctx.preprocess_seconds
    return from_topk(
        "BU-DCCS", ctx, k, topk, seconds, n_candidates
    )
