"""Derandomized-exponential compaction schedule (paper §2.1, Fact 4).

The relative-compactor decides *how many* trailing sections of its buffer
to compact from a per-level integer state ``C``: the (C+1)-st compaction
involves ``z(C) + 1`` sections where ``z(C)`` is the number of trailing
ones in the binary representation of C.  Section 1 is therefore involved
in every compaction, section 2 in every other one, section 3 in every
fourth, ... — a derandomized Exp(1/2) distribution.

Under merges, states combine via bitwise OR (paper Fact 15/18), which
preserves the crucial property (Fact 4): between any two compactions that
involve exactly j sections there is one involving more than j sections.
"""
from __future__ import annotations


def trailing_ones(c: int) -> int:
    """Number of trailing 1-bits in the binary representation of ``c``.

    >>> [trailing_ones(c) for c in range(8)]
    [0, 1, 0, 2, 0, 1, 0, 3]
    """
    if c < 0:
        raise ValueError(f"state must be non-negative, got {c}")
    z = 0
    while c & 1:
        z += 1
        c >>= 1
    return z


def sections_to_compact(state: int, num_sections: int) -> int:
    """Sections involved in the next compaction given the schedule state.

    Returns ``z(state) + 1`` capped at ``num_sections`` (the cap is a
    defensive bound; Observation 17 shows C <= N/k so the cap binds only
    for the single "compact everything" event per parameter epoch).
    """
    if num_sections < 1:
        raise ValueError(f"num_sections must be >= 1, got {num_sections}")
    return min(trailing_ones(state) + 1, num_sections)


def merge_states(c1: int, c2: int) -> int:
    """Combine two schedule states from merged sketches: bitwise OR.

    Fact 15: a 1-bit in either input survives in the output, which is
    what makes the charging argument (Fact 18) go through under an
    arbitrary merge tree.  Fact 16: OR <= sum, so the state stays
    bounded by the number of compactions represented in the merge tree.
    """
    if c1 < 0 or c2 < 0:
        raise ValueError(f"states must be non-negative, got {c1}, {c2}")
    return c1 | c2
