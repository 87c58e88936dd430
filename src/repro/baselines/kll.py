"""KLL sketch — the optimal *additive*-error baseline (Karnin-Lang-Liberty,
FOCS'16; paper reference [12]).

The paper's algorithm starts from the KLL compactor but changes which
items a compaction touches.  We implement classic KLL here as the
additive-error comparator: level-h buffers have geometrically decaying
capacities k * c^(H-h) (c = 2/3, minimum 2); a full buffer sorts itself
and emits every other item to level h+1.  Unlike the relative-compactor,
*every* item in the buffer participates, including the smallest — which
is exactly why KLL's error is a uniform +-eps*n additive band, and its
*relative* error at rank r blows up like eps*n/r in the tails (the
paper's Table T3 contrast).

Merging concatenates levels then restores capacities bottom-up, making
the summary fully mergeable like the original.
"""
from __future__ import annotations

import math
from typing import Iterable, List, Optional, Sequence, Tuple

import numpy as np

from repro.core import estimator


class KllSketch:
    """Additive-error streaming quantiles sketch (constant-factor KLL)."""

    DECAY = 2.0 / 3.0
    MIN_CAP = 2

    def __init__(self, k: int = 200, *, seed: int = 0) -> None:
        if k < 4:
            raise ValueError(f"k must be >= 4, got {k}")
        self.k = int(k)
        self.levels: List[List[np.ndarray]] = [[]]  # chunk lists per level
        self._counts: List[int] = [0]
        self.n = 0
        self.rng = np.random.default_rng(seed)

    # ------------------------------------------------------------------ sizing

    def capacity(self, h: int) -> int:
        """Capacity of level h given current height (top level gets k)."""
        height = len(self.levels) - 1
        return max(self.MIN_CAP, int(math.ceil(self.k * self.DECAY ** (height - h))))

    def num_retained(self) -> int:
        return sum(self._counts)

    @property
    def num_levels(self) -> int:
        return len(self.levels)

    # ------------------------------------------------------------------ update

    def update(self, values: Iterable[float] | np.ndarray | float) -> "KllSketch":
        arr = np.asarray(values, dtype=np.float64)
        if arr.ndim == 0:
            arr = arr.reshape(1)
        arr = arr.ravel()
        if np.any(np.isnan(arr)):
            raise ValueError("NaN items are not totally ordered; refusing to insert")
        pos, total = 0, arr.size
        while pos < total:
            room = self.capacity(0) - self._counts[0]
            if room <= 0:
                self._compress()
                continue
            take = min(room, total - pos)
            self.levels[0].append(arr[pos : pos + take])
            self._counts[0] += take
            pos += take
            self.n += take
        if self._counts[0] >= self.capacity(0):
            self._compress()
        return self

    def _level_values(self, h: int) -> np.ndarray:
        chunks = self.levels[h]
        if not chunks:
            return np.empty(0, dtype=np.float64)
        if len(chunks) > 1:
            merged = np.concatenate(chunks)
            self.levels[h] = [merged]
        return self.levels[h][0]

    def _compress(self) -> None:
        """Bottom-up: compact every level over its capacity."""
        h = 0
        while h < len(self.levels):
            if self._counts[h] >= self.capacity(h) and self._counts[h] >= 2:
                arr = np.sort(self._level_values(h))
                offset = int(self.rng.integers(0, 2))
                promoted = arr[offset::2].copy()
                # An odd-length buffer keeps one item behind (classic KLL
                # keeps the unpaired item at level h to conserve weight).
                if arr.size % 2 == 1:
                    keep = arr[-1:] if offset == 0 else arr[:1]
                    promoted = (arr[:-1] if offset == 0 else arr[1:])[offset::2].copy()
                else:
                    keep = np.empty(0, dtype=np.float64)
                self.levels[h] = [keep]
                self._counts[h] = keep.size
                if h + 1 == len(self.levels):
                    self.levels.append([])
                    self._counts.append(0)
                self.levels[h + 1].append(promoted)
                self._counts[h + 1] += promoted.size
            h += 1

    # ------------------------------------------------------------------- merge

    def merge(self, other: "KllSketch") -> "KllSketch":
        if not isinstance(other, KllSketch):
            raise TypeError(f"cannot merge KllSketch with {type(other).__name__}")
        if self.k != other.k:
            raise ValueError(f"k mismatch: {self.k} != {other.k}")
        while len(self.levels) < len(other.levels):
            self.levels.append([])
            self._counts.append(0)
        for h in range(len(other.levels)):
            vals = other._level_values(h)
            if vals.size:
                self.levels[h].append(vals.copy())
                self._counts[h] += vals.size
        self.n += other.n
        self._compress()
        return self

    # ----------------------------------------------------------------- queries

    def level_arrays(self) -> List[Tuple[int, np.ndarray]]:
        return [
            (1 << h, np.sort(self._level_values(h))) for h in range(len(self.levels))
        ]

    def rank(self, y: float) -> int:
        return estimator.estimate_rank(self, y)

    def ranks(self, ys: Sequence[float]) -> np.ndarray:
        return estimator.estimate_ranks(self, ys)

    def quantile(self, phi: float) -> float:
        return estimator.estimate_quantile(self, phi)

    def quantiles(self, phis: Sequence[float]) -> np.ndarray:
        return estimator.estimate_quantiles(self, phis)

    def total_weight(self) -> int:
        return estimator.total_weight(self)

    # ------------------------------------------------------------------- serde

    def to_dict(self) -> dict:
        return {
            "type": "kll",
            "version": 1,
            "k": self.k,
            "n": self.n,
            "levels": [self._level_values(h).copy() for h in range(len(self.levels))],
            "rng_state": self.rng.bit_generator.state,
        }

    @classmethod
    def from_dict(cls, d: dict) -> "KllSketch":
        if d.get("type") != "kll" or d.get("version") != 1:
            raise ValueError(f"not a v1 KLL sketch dict: {d.get('type')!r}")
        sk = cls(d["k"])
        sk.n = d["n"]
        sk.levels = [[np.asarray(a, dtype=np.float64)] for a in d["levels"]]
        sk._counts = [a.size for a in (np.asarray(x) for x in d["levels"])]
        if not sk.levels:
            sk.levels, sk._counts = [[]], [0]
        sk.rng = np.random.default_rng()
        sk.rng.bit_generator.state = d["rng_state"]
        return sk

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"KllSketch(k={self.k}, n={self.n}, retained={self.num_retained()})"
