"""Figs. 26–27 — scalability vs vertex fraction p / layer fraction q.

This is the sweep that runs the full distributed pipeline per point
(Spark preprocessing over the subsampled stack-lite graph, then search).
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, get_spark  # noqa: E402


def main(spark=None, **overrides):
    from repro.harness import sweep_scalability

    spark = spark or get_spark("fig26_27")
    return sweep_scalability(spark=spark, **overrides)


if __name__ == "__main__":
    emit("sweep_fig26_27_scalability", main())
