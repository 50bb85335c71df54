"""Figs. 29 & 30 benchmark: MiMAG vs BU-DCCS comparison.

Shape claims: BU-DCCS is much faster than MiMAG, covers at least as many
vertices, finds a (much) larger proportion of ground-truth complexes, and
the mined quasi-cliques are overwhelmingly contained in Cov(R_C).
"""
import pytest


@pytest.mark.benchmark(group="fig29_30")
def test_fig29_mimag_comparison(benchmark):
    from repro.harness import mimag_comparison, rows_to_markdown, save_rows

    rows, _ = benchmark.pedantic(mimag_comparison, rounds=1, iterations=1)
    save_rows("fig29_mimag", rows)
    print("\n" + rows_to_markdown(rows))

    by = {(r["dataset"], r["d"], r["algorithm"]): r for r in rows}
    for name in ("ppi-lite", "author-lite"):
        for d in (2, 3, 4):
            mimag_row = by[(name, d, "MiMAG")]
            bu = by[(name, d, "BU-DCCS")]
            assert bu["seconds"] < mimag_row["seconds"]
            assert bu["cov"] >= mimag_row["cov"]
            assert bu["proportion"] >= mimag_row["proportion"]


@pytest.mark.benchmark(group="fig29_30")
def test_fig30_containment_distribution(benchmark):
    from repro.harness import (
        containment_distribution,
        rows_to_markdown,
        save_rows,
    )

    rows = benchmark.pedantic(containment_distribution, rounds=1, iterations=1)
    save_rows("fig30_containment", rows)
    print("\n" + rows_to_markdown(rows))

    # most quasi-cliques are entirely inside Cov(R_C) (paper: 70%+ fully)
    for r in rows:
        if r["n_quasi_cliques"] >= 10:
            assert r[f"overlap_{r['|Q|']}"] >= 0.5, r
