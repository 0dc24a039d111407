"""Dimensions over time series metadata (paper §II).

A dimension is a hierarchy of members with ⊤ at level 0 and the time
series' own member at the lowest level *n*.  In ModelarDB+'s
denormalised schema each dimension contributes one metadata column per
level; here a :class:`Dimension` names those columns from level 1
(just below ⊤) down to level *n*.

Example (running example in the paper): ``Location`` with levels
``Country (1) → Region (2) → Park (3) → Turbine (4)`` is
``Dimension("Location", ("country", "region", "park", "turbine"))``.

The Lowest Common Ancestor (LCA) level of two sets of series is the
deepest level at which *all* series share members starting from ⊤
(paper Fig. 7); it drives the dimension distance used for automatic
grouping (§IV-B/C).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Sequence, Tuple

import pandas as pd


@dataclass(frozen=True)
class Dimension:
    """A named hierarchy; ``columns[k-1]`` holds the level-``k`` member."""

    name: str
    columns: Tuple[str, ...]  # level 1 (below ⊤) … level n (lowest)

    @property
    def n_levels(self) -> int:
        return len(self.columns)

    def column_for_level(self, level: int) -> str:
        """1-based level → metadata column (level n = lowest)."""
        if not 1 <= level <= self.n_levels:
            raise ValueError(f"level {level} outside 1..{self.n_levels}")
        return self.columns[level - 1]


def lca_level(meta: pd.DataFrame, dim: Dimension, rows_a, rows_b) -> int:
    """Deepest level where all series of both groups share members.

    ``rows_a``/``rows_b`` are index arrays into ``meta``.  Returns 0 when
    only ⊤ is shared.
    """
    lca = 0
    for level in range(1, dim.n_levels + 1):
        col = dim.column_for_level(level)
        vals = set(meta[col].iloc[rows_a]) | set(meta[col].iloc[rows_b])
        if len(vals) != 1:
            break
        lca = level
    return lca


def distance(meta: pd.DataFrame, dims: Sequence[Dimension], rows_a, rows_b,
             weights: Dict[str, float] | None = None) -> float:
    """Dimension distance between two groups (§IV-C).

    ``dist = (Σ_d w_d · (levels_d − lca_d)/levels_d) / |D|`` capped at
    1.0, where ``w_d`` is the *reciprocal* of the user-provided weight
    (raising a weight makes its dimension matter more by shrinking its
    contribution, so equal members elsewhere dominate).
    """
    weights = weights or {}
    total = 0.0
    for dim in dims:
        w = 1.0 / float(weights.get(dim.name, 1.0))
        lca = lca_level(meta, dim, rows_a, rows_b)
        total += w * (dim.n_levels - lca) / dim.n_levels
    return min(total / len(dims), 1.0)


def auto_distance(dims: Sequence[Dimension]) -> float:
    """The lowest non-zero distance possible: ``(1/max(Levels))/|D|``."""
    return (1.0 / max(d.n_levels for d in dims)) / len(dims)
