"""Fig. 28 benchmark: preprocessing-method ablation for BU and TD.

Shape claim: disabling any preprocessing method (vertex deletion, layer
sorting, result initialisation) does not make the algorithm faster, and
No-Pre is the slowest configuration.
"""
import pytest


@pytest.mark.benchmark(group="fig28")
def test_fig28_preprocessing_ablation(benchmark):
    from repro.harness import (
        rows_to_markdown,
        save_rows,
        sweep_preprocessing_ablation,
    )

    rows = benchmark.pedantic(
        sweep_preprocessing_ablation, rounds=1, iterations=1
    )
    save_rows("fig28_preprocessing", rows)
    print("\n" + rows_to_markdown(rows))

    by = {(r["algorithm"], r["variant"]): r for r in rows}
    for algo in ("BU-DCCS", "TD-DCCS"):
        full = by[(algo, "Full")]
        nopre = by[(algo, "No-Pre")]
        assert not full["dnf"]
        # the fully-preprocessed variant is not slower than No-Pre
        if not nopre["dnf"]:
            assert full["seconds"] <= nopre["seconds"] * 1.2
