"""Tests for the driver-side exact-rank ground truth."""
import numpy as np
import pytest

from repro.baselines.exact import ExactRanks, relative_errors


class TestExactRanks:
    def test_inclusive_rank(self):
        ex = ExactRanks([3.0, 1.0, 2.0])
        assert ex.rank(2.0) == 2 and ex.rank(1.9) == 1 and ex.rank(0.0) == 0
        assert ex.rank(10.0) == 3

    def test_duplicates(self):
        ex = ExactRanks([2.0, 2.0, 2.0, 5.0])
        assert ex.rank(2.0) == 3 and ex.rank(4.0) == 3 and ex.rank(5.0) == 4

    def test_ranks_vectorized(self):
        data = np.random.default_rng(0).random(1000)
        ex = ExactRanks(data)
        qs = np.linspace(0, 1, 97)
        assert list(ex.ranks(qs)) == [ex.rank(q) for q in qs]

    def test_matches_bruteforce(self):
        rng = np.random.default_rng(1)
        data = rng.integers(0, 50, 200).astype(float)
        ex = ExactRanks(data)
        for q in rng.random(20) * 60 - 5:
            assert ex.rank(q) == int(np.sum(data <= q))

    def test_value_at_rank(self):
        ex = ExactRanks([10.0, 30.0, 20.0])
        assert ex.value_at_rank(1) == 10.0
        assert ex.value_at_rank(2) == 20.0
        assert ex.value_at_rank(3) == 30.0
        with pytest.raises(ValueError):
            ex.value_at_rank(0)
        with pytest.raises(ValueError):
            ex.value_at_rank(4)

    def test_values_at_ranks(self):
        ex = ExactRanks(np.arange(100.0))
        got = ex.values_at_ranks([1, 50, 100])
        assert list(got) == [0.0, 49.0, 99.0]
        with pytest.raises(ValueError):
            ex.values_at_ranks([0])

    def test_rank_value_roundtrip(self):
        data = np.random.default_rng(2).permutation(500).astype(float)
        ex = ExactRanks(data)
        for r in (1, 7, 250, 500):
            assert ex.rank(ex.value_at_rank(r)) == r


class TestRelativeErrors:
    def test_zero_when_exact(self):
        assert list(relative_errors([5, 10], [5, 10])) == [0.0, 0.0]

    def test_values(self):
        got = relative_errors([110, 90], [100, 100])
        assert list(got) == [0.1, 0.1]

    def test_rejects_zero_rank(self):
        with pytest.raises(ValueError):
            relative_errors([1], [0])
