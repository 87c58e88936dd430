"""Exact-rank ground truth for accuracy experiments.

Driver-side numpy implementation for streams that fit in memory; the
Spark-SQL version (cross-checked against DuckDB through
``repro.oracle.assert_equivalent``) lives in ``repro.spark.queries``.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np


class ExactRanks:
    """Sorted copy of the data; answers exact inclusive ranks R(y)."""

    def __init__(self, values: np.ndarray) -> None:
        self._sorted = np.sort(np.asarray(values, dtype=np.float64).ravel())

    @property
    def n(self) -> int:
        return int(self._sorted.size)

    def ranks(self, ys: Sequence[float]) -> np.ndarray:
        qs = np.asarray(ys, dtype=np.float64).ravel()
        return np.searchsorted(self._sorted, qs, side="right").astype(np.int64)

    def rank(self, y: float) -> int:
        return int(self.ranks([y])[0])

    def value_at_rank(self, r: int) -> float:
        """The item whose inclusive rank is exactly r (1-based)."""
        if not (1 <= r <= self.n):
            raise ValueError(f"rank must be in [1, {self.n}], got {r}")
        return float(self._sorted[r - 1])

    def values_at_ranks(self, rs: Sequence[int]) -> np.ndarray:
        rr = np.asarray(rs, dtype=np.int64).ravel()
        if np.any((rr < 1) | (rr > self.n)):
            raise ValueError(f"ranks must be in [1, {self.n}]")
        return self._sorted[rr - 1]


def relative_errors(
    est_ranks: np.ndarray, true_ranks: np.ndarray
) -> np.ndarray:
    """|R-hat - R| / R elementwise; R must be >= 1."""
    tr = np.asarray(true_ranks, dtype=np.float64)
    if np.any(tr < 1):
        raise ValueError("true ranks must be >= 1 for relative error")
    return np.abs(np.asarray(est_ranks, dtype=np.float64) - tr) / tr
