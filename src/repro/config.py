"""Experiment parameter grid — the paper's Fig. 13, verbatim.

``s`` has two configurations: the small-s grid is absolute; the large-s
grid is relative to the number of layers ``l`` of the dataset at hand.
``p``/``q`` control the vertex/layer fractions in the scalability test.
"""
from __future__ import annotations

from typing import List

K_VALUES: List[int] = [5, 10, 15, 20, 25]
K_DEFAULT: int = 10

D_VALUES: List[int] = [2, 3, 4, 5, 6]
D_DEFAULT: int = 4

S_SMALL_VALUES: List[int] = [1, 2, 3, 4, 5]
S_SMALL_DEFAULT: int = 3

P_VALUES: List[float] = [0.2, 0.4, 0.6, 0.8, 1.0]
Q_VALUES: List[float] = [0.2, 0.4, 0.6, 0.8, 1.0]


def s_large_values(l: int) -> List[int]:
    """``{l−4, l−3, l−2, l−1, l}`` for a dataset with ``l`` layers."""
    return [l - 4, l - 3, l - 2, l - 1, l]


def s_large_default(l: int) -> int:
    return l - 2
