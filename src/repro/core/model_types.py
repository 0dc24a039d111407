"""Model-type interface and registry (paper §II, §III-A, §V).

A *model type* knows how to fit a model to a prefix of a buffered time
series group within a per-value error bound, how to serialise the model's
parameters to a compact blob, how to reconstruct the represented values,
and (for lossy types) how to compute aggregates directly from the model
in constant time.

All fitting operates on a *group value matrix* ``V`` of shape
``(n_timestamps, n_series)`` containing the scaled values of the group's
currently active series, plus a matching matrix ``delta`` of per-value
allowed deviations (``delta = eps_pct/100 * |v|`` — ModelarDB's relative
error bound; ``eps_pct == 0`` degenerates to lossless).

The registry maps integer Mids to model types, mirroring the paper's
``Model`` table (Mid → Java classpath).  User-defined model types are
added with :func:`register` without touching the rest of the system.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Dict, Optional, Tuple

import numpy as np

# Canonical Mids used across the storage schema and query layer.
MID_PMC_MEAN = 1
MID_SWING = 2
MID_GORILLA = 3
MID_FALLBACK = 4
MID_PMC_MR = 5


@dataclass(frozen=True)
class FitResult:
    """Outcome of fitting one model type to a buffer prefix.

    ``length`` is the number of leading timestamps the model represents
    (0 = the type cannot represent even the first timestamp's values).
    ``params`` is the serialised model blob for that prefix; ``None``
    when ``length == 0``.
    """

    length: int
    params: Optional[bytes]

    @property
    def size_bytes(self) -> int:
        return len(self.params) if self.params is not None else 0


class ModelType:
    """Base class; concrete types override the four operations."""

    mid: int = -1
    name: str = "abstract"
    lossless: bool = False

    def fit(self, ts: np.ndarray, V: np.ndarray, delta: np.ndarray,
            length_bound: int) -> FitResult:
        """Fit a model to the longest representable prefix of (ts, V)."""
        raise NotImplementedError

    def reconstruct(self, params: bytes, ts: np.ndarray, n_series: int) -> np.ndarray:
        """Return the (len(ts), n_series) matrix of represented values."""
        raise NotImplementedError

    def aggregates(self, params: bytes, ts: np.ndarray, n_series: int
                   ) -> Optional[Tuple[float, float, float, float]]:
        """(count, sum, min, max) over ALL series/timestamps in constant
        time, or ``None`` when the type requires decompression (then the
        query layer falls back to :meth:`reconstruct`).  Values are in
        the *scaled* (model) domain; per-series scaling is applied by
        the query layer."""
        return None


_REGISTRY: Dict[int, ModelType] = {}


def register(model_type: ModelType) -> None:
    """Register a model type under its Mid (paper's Model table)."""
    _REGISTRY[model_type.mid] = model_type


def by_mid(mid: int) -> ModelType:
    return _REGISTRY[mid]


def registered_mids() -> Tuple[int, ...]:
    return tuple(sorted(_REGISTRY))


def first_false(valid: np.ndarray) -> int:
    """Length of the leading all-True prefix of a boolean array."""
    if valid.all():
        return len(valid)
    return int(np.argmax(~valid))
