"""Group-to-worker partitioning (paper §IV-C, after Korf's multi-way
number partitioning).

Each group is assigned to exactly one worker so a group's series are
ingested by a single node (no cross-node latency/bandwidth) and queries
over a group avoid shuffles.  The objective is to minimise the spread of
data points per minute between the most and least loaded worker; the
greedy longest-processing-time heuristic assigns the heaviest group to
the lightest worker, which is the standard constructive approximation to
Korf's exact method and is what matters at the scales evaluated.
"""
from __future__ import annotations

from typing import Dict

import pandas as pd

MS_PER_MINUTE = 60_000


def data_points_per_minute(meta: pd.DataFrame) -> pd.Series:
    """Per-group ingest load: Σ_series (ms per minute / SI)."""
    rate = MS_PER_MINUTE / meta["si"].astype(float)
    return rate.groupby(meta["gid"]).sum()


def partition_groups(meta: pd.DataFrame, n_workers: int) -> Dict[int, int]:
    """gid → worker id (0-based), greedy LPT on data points/minute."""
    loads = [0.0] * n_workers
    assignment: Dict[int, int] = {}
    weights = data_points_per_minute(meta).sort_values(ascending=False)
    for gid, w in weights.items():
        worker = min(range(n_workers), key=lambda k: loads[k])
        loads[worker] += float(w)
        assignment[int(gid)] = worker
    return assignment


def load_spread(meta: pd.DataFrame, assignment: Dict[int, int],
                n_workers: int) -> float:
    """max-min worker load — the quantity the paper minimises."""
    loads = [0.0] * n_workers
    per_group = data_points_per_minute(meta)
    for gid, worker in assignment.items():
        loads[worker] += float(per_group.loc[gid])
    return max(loads) - min(loads)
