"""Fig. 30 — distribution of |Q ∩ Cov(R_C)| over quasi-cliques Q."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit  # noqa: E402


def main(spark=None, **overrides):
    from repro.harness import containment_distribution

    return containment_distribution(**overrides)


if __name__ == "__main__":
    emit("table_fig30_containment", main())
