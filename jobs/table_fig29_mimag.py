"""Fig. 29 — MiMAG vs BU-DCCS comparison table."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit  # noqa: E402


def main(spark=None, **overrides):
    from repro.harness import mimag_comparison

    rows, _ = mimag_comparison(**overrides)
    return rows


if __name__ == "__main__":
    emit("table_fig29_mimag", main())
