"""The REQ sketch — Relative-Error Quantiles (paper Algorithms 2–4).

A stack of relative-compactors: level h's compaction output feeds level
h+1, where items count with weight 2^h.  The sketch supports

* streaming inserts of arbitrary length with no foreknowledge of n —
  the upper bound N squares (N <- N^2) whenever the processed count
  exceeds it, after App.-C "special compactions" (the paper's
  footnote-7 practical variant of §5);
* full mergeability (Algorithm 4): schedule states combine via bitwise
  OR, buffers concatenate, and a single bottom-up compaction pass
  restores capacity — an arbitrary merge tree preserves the
  multiplicative error guarantee;
* rank / CDF / quantile queries via the weighted coreset of all levels.

Two parameterizations:

* ``ReqSketch(k=...)`` — fixed even section size k (DataSketches
  practice); buffers grow only via num_sections as N squares.
* ``ReqSketch.from_error_mergeable(eps, delta)`` — adaptive k(N) per the
  paper's Eq. (15), recomputed at every N growth.

``schedule="all"`` turns the instance into the paper's naive
protect-half strawman (always compact the whole top half) with the
Θ(ε⁻²·log(ε²n)) space/accuracy trade-off; everything else is shared.
"""
from __future__ import annotations

import math
from typing import Iterable, List, Optional, Sequence, Tuple

import numpy as np

from repro.core import estimator, params as P
from repro.core.compactor import RelativeCompactor
from repro.core.schedule import merge_states


class ReqSketch:
    """Mergeable relative-error streaming quantiles sketch."""

    def __init__(
        self,
        k: int = 32,
        *,
        seed: int = 0,
        schedule: str = "req",
        khat: Optional[float] = None,
        k_const: int = 2 ** 5,
        N0: Optional[int] = None,
        _rng: Optional[np.random.Generator] = None,
    ) -> None:
        self._khat = khat
        self._k_const = k_const
        self.schedule = schedule
        if khat is not None:
            self.N = int(N0) if N0 is not None else max(P.initial_N(2), math.ceil(8 * khat))
            self.k = P.k_of_N(khat, self.N, const=k_const)
        else:
            self.k = int(k)
            self.N = int(N0) if N0 is not None else P.initial_N(self.k)
        self.params = P.CompactorParams(self.k, P.num_sections_mergeable(self.N, self.k))
        self.levels: List[RelativeCompactor] = [self._new_level()]
        self.n = 0
        # Smallest buffer size ever in force (here or in any merged-in
        # operand): ranks <= _min_B/2 are deterministically exact.
        self._min_B = self.params.B
        self.rng = _rng if _rng is not None else np.random.default_rng(seed)

    # ------------------------------------------------------------ constructors

    @classmethod
    def from_error_streaming(
        cls, eps: float, delta: float, n: int, *, seed: int = 0, schedule: str = "req"
    ) -> "ReqSketch":
        """Known-(upper bound on)-n parameterization per Eq. (6) / Theorem 13."""
        k = P.k_streaming(eps, delta, n)
        return cls(k, seed=seed, schedule=schedule, N0=max(n, P.initial_N(k)))

    @classmethod
    def from_error_mergeable(
        cls,
        eps: float,
        delta: float,
        *,
        seed: int = 0,
        k_const: int = 2 ** 5,
        schedule: str = "req",
    ) -> "ReqSketch":
        """Unknown-n parameterization per Eqs. (15)/(25); k adapts as N grows.

        ``k_const`` defaults to the paper's proof constant 2^5; pass a
        smaller even factor for practical space (DESIGN.md).
        """
        return cls(
            seed=seed,
            schedule=schedule,
            khat=P.khat_mergeable(eps, delta),
            k_const=k_const,
        )

    @classmethod
    def from_error_small_delta(
        cls, eps: float, delta: float, n: int, *, seed: int = 0
    ) -> "ReqSketch":
        """Theorem 2 parameterization (Eq. (36)) — log log(1/delta) dependence."""
        k = P.k_small_delta(eps, delta)
        return cls(k, seed=seed, N0=max(n, P.initial_N(k)))

    # ------------------------------------------------------------------ sizing

    @property
    def B(self) -> int:
        return self.params.B

    @property
    def num_levels(self) -> int:
        return len(self.levels)

    def num_retained(self) -> int:
        """Universe items currently stored — the paper's space measure."""
        return sum(len(lv) for lv in self.levels)

    @property
    def protected_head(self) -> int:
        """Largest rank r such that R-hat(y) == R(y) with probability 1
        for every y of rank <= r, for ANY input order: half the smallest
        buffer size the sketch (or any merged-in operand) ever had.
        Compactions only ever touch slots above the current B/2, so an
        item whose running rank never exceeds min(B)/2 is never compacted."""
        return self._min_B // 2

    def is_empty(self) -> bool:
        return self.n == 0

    # ------------------------------------------------------------------ update

    def update(self, values: Iterable[float] | np.ndarray | float) -> "ReqSketch":
        """Insert a batch (or a single item) into the stream."""
        arr = np.asarray(values, dtype=np.float64)
        if arr.ndim == 0:
            arr = arr.reshape(1)
        arr = arr.ravel()
        if np.any(np.isnan(arr)):
            raise ValueError("NaN items are not totally ordered; refusing to insert")
        pos, total = 0, arr.size
        while pos < total:
            lv0 = self.levels[0]
            room = self.params.B - len(lv0)
            if room <= 0:
                self._compact_cascade()
                continue
            take = min(room, total - pos)
            lv0.append(arr[pos : pos + take])
            pos += take
            self.n += take
            if self.n > self.N:
                self._grow()
        if len(self.levels[0]) >= self.params.B:
            self._compact_cascade()
        return self

    # ------------------------------------------------------------------- merge

    def merge(self, other: "ReqSketch") -> "ReqSketch":
        """Merge ``other`` into ``self`` (Algorithm 4). ``other`` is unchanged.

        Both operands must share the section-size policy (identical fixed
        k, or identical k-hat) and schedule flavour.
        """
        self._check_mergeable(other)
        if other.n == 0:
            return self
        src = other.copy()
        # Line 1: combined input size.
        self.n += src.n
        # Ensure self carries the larger parameter epoch before the
        # standard growth check (the paper swaps operands; we grow self).
        while self.N < src.N:
            self._grow_once()
        # Lines 2-5: self's bound too small for the combined input.
        while self.N < self.n:
            self._grow_once()
        # Lines 6-7: source's parameters lag behind - special-compact it
        # once with its OWN (old) geometry before adopting buffers.
        if src.N < self.N:
            src._special_compact_all(self.rng)
        self._min_B = min(self._min_B, src._min_B)
        # Lines 8-11: combine buffers and schedule states per level.
        while len(self.levels) < len(src.levels):
            self.levels.append(self._new_level())
        for h, src_lv in enumerate(src.levels):
            dst = self.levels[h]
            dst.state = merge_states(dst.state, src_lv.state)
            vals = src_lv.values()
            if vals.size:
                dst.append(vals)
        # Lines 12-17: one bottom-up scheduled pass.
        self._compact_cascade()
        return self

    @staticmethod
    def merge_of(a: "ReqSketch", b: "ReqSketch") -> "ReqSketch":
        """Non-destructive merge: returns a new sketch, operands untouched."""
        return a.copy().merge(b)

    def copy(self) -> "ReqSketch":
        """Deep copy (buffers copied; RNG state copied, streams diverge)."""
        return self.from_dict(self.to_dict())

    # ----------------------------------------------------------------- queries

    def level_arrays(self) -> List[Tuple[int, np.ndarray]]:
        """(weight, sorted items) per level — the Estimate-Rank coreset."""
        return [(1 << h, lv.sorted_values()) for h, lv in enumerate(self.levels)]

    def rank(self, y: float) -> int:
        return estimator.estimate_rank(self, y)

    def ranks(self, ys: Sequence[float]) -> np.ndarray:
        return estimator.estimate_ranks(self, ys)

    def cdf(self, ys: Sequence[float]) -> np.ndarray:
        return estimator.estimate_cdf(self, ys)

    def quantile(self, phi: float) -> float:
        return estimator.estimate_quantile(self, phi)

    def quantiles(self, phis: Sequence[float]) -> np.ndarray:
        return estimator.estimate_quantiles(self, phis)

    def total_weight(self) -> int:
        return estimator.total_weight(self)

    # ------------------------------------------------------------------- serde

    def to_dict(self) -> dict:
        return {
            "type": "req",
            "version": 1,
            "k": self.k,
            "khat": self._khat,
            "k_const": self._k_const,
            "schedule": self.schedule,
            "N": self.N,
            "n": self.n,
            "min_B": self._min_B,
            "levels": [lv.to_dict() for lv in self.levels],
            "rng_state": self.rng.bit_generator.state,
        }

    @classmethod
    def from_dict(cls, d: dict) -> "ReqSketch":
        if d.get("type") != "req" or d.get("version") != 1:
            raise ValueError(f"not a v1 REQ sketch dict: {d.get('type')!r}")
        sk = cls(
            d["k"],
            schedule=d["schedule"],
            khat=d["khat"],
            k_const=d["k_const"],
            N0=d["N"],
        )
        sk.n = d["n"]
        sk._min_B = d["min_B"]
        sk.levels = [
            RelativeCompactor.from_dict(ld, sk.params) for ld in d["levels"]
        ]
        if not sk.levels:
            sk.levels = [sk._new_level()]
        sk.rng = np.random.default_rng()
        sk.rng.bit_generator.state = d["rng_state"]
        return sk

    # --------------------------------------------------------------- internals

    def _new_level(self) -> RelativeCompactor:
        return RelativeCompactor(self.params, schedule=self.schedule)

    def _check_mergeable(self, other: "ReqSketch") -> None:
        if not isinstance(other, ReqSketch):
            raise TypeError(f"cannot merge ReqSketch with {type(other).__name__}")
        if self.schedule != other.schedule:
            raise ValueError("cannot merge sketches with different schedules")
        if (self._khat is None) != (other._khat is None):
            raise ValueError("cannot merge fixed-k with adaptive-k sketches")
        if self._khat is None:
            if self.k != other.k:
                raise ValueError(f"section size mismatch: {self.k} != {other.k}")
        elif not math.isclose(self._khat, other._khat):
            raise ValueError(f"k-hat mismatch: {self._khat} != {other._khat}")

    def _compact_cascade(self) -> None:
        """Bottom-up pass: compact every at-capacity level once."""
        h = 0
        while h < len(self.levels):
            lv = self.levels[h]
            if len(lv) >= self.params.B:
                promoted = lv.compact(self.rng)
                if h + 1 == len(self.levels):
                    self.levels.append(self._new_level())
                self.levels[h + 1].append(promoted)
            h += 1

    def _special_compact_all(self, rng: np.random.Generator) -> None:
        """App.-C special compactions: shrink every non-top level to <= B/2."""
        for h in range(len(self.levels) - 1):
            promoted = self.levels[h].compact(rng, special=True)
            if promoted.size:
                self.levels[h + 1].append(promoted)

    def _grow_once(self) -> None:
        """One parameter-epoch step: special compactions, then N <- N^2."""
        self._special_compact_all(self.rng)
        self.N = P.next_N(self.N)
        if self._khat is not None:
            self.k = P.k_of_N(self._khat, self.N, const=self._k_const)
        self.params = P.CompactorParams(
            self.k, P.num_sections_mergeable(self.N, self.k)
        )
        for lv in self.levels:
            lv.params = self.params
        # The top level received promotions and new B may still be
        # exceeded in pathological cases; restore capacity.
        self._compact_cascade()

    def _grow(self) -> None:
        while self.n > self.N:
            self._grow_once()

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return (
            f"ReqSketch(k={self.k}, n={self.n}, N={self.N}, levels={self.num_levels}, "
            f"retained={self.num_retained()}, schedule={self.schedule!r})"
        )
