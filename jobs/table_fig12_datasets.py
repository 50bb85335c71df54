"""Fig. 12 — dataset statistics table (computed distributively on Spark)."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, get_spark  # noqa: E402


def main(spark=None, datasets=None):
    """Compute |V|, Σ|Ei|, |∪Ei|, l for each synthetic stand-in via Spark."""
    from repro.datasets import SPECS, load_spark

    spark = spark or get_spark("fig12")
    rows = []
    for name in datasets or list(SPECS):
        g, _ = load_spark(spark, name)
        st = g.stats()
        spec = SPECS[name]
        rows.append(
            {
                "dataset": name,
                "paper_dataset": spec.paper_name,
                "V": st["n_vertices"],
                "sum_E": st["sum_edges"],
                "union_E": st["union_edges"],
                "l": st["n_layers"],
                "paper_V": spec.paper_stats[0],
                "paper_sum_E": spec.paper_stats[1],
                "paper_union_E": spec.paper_stats[2],
            }
        )
    return rows


if __name__ == "__main__":
    emit("fig12_datasets", main())
