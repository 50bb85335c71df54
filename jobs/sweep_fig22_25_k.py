"""sweep_fig22_25_k — see DESIGN.md §3 for the table this reproduces."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, get_spark  # noqa: E402


def main(spark=None, **overrides):
    """Run the sweep behind this table; overrides forward to the harness."""
    from repro.harness import sweep_k

    return sweep_k(**overrides)


if __name__ == "__main__":
    emit("sweep_fig22_25_k", main())
