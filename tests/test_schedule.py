"""Unit tests for the derandomized compaction schedule (paper §2.1, Fact 4)."""
import pytest

from repro.core.schedule import merge_states, sections_to_compact, trailing_ones


class TestTrailingOnes:
    @pytest.mark.parametrize(
        "c,expected",
        [
            (0, 0), (1, 1), (2, 0), (3, 2), (4, 0), (5, 1), (6, 0), (7, 3),
            (8, 0), (15, 4), (16, 0), (23, 3), (31, 5), (2 ** 20 - 1, 20),
            (2 ** 20, 0), (0b101011, 2), (0b110111, 3),
        ],
    )
    def test_values(self, c, expected):
        assert trailing_ones(c) == expected

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            trailing_ones(-1)

    @pytest.mark.parametrize("c", range(1, 200))
    def test_matches_bit_identity(self, c):
        # z(c) = number of low bits set = length of the maximal 1-suffix.
        z = trailing_ones(c)
        assert (c >> z) & 1 == 0 or c >> z == 0
        assert c & ((1 << z) - 1) == (1 << z) - 1

    def test_doctest_row(self):
        assert [trailing_ones(c) for c in range(8)] == [0, 1, 0, 2, 0, 1, 0, 3]


class TestSectionsToCompact:
    @pytest.mark.parametrize("state", range(64))
    def test_at_least_one_section(self, state):
        assert sections_to_compact(state, 8) >= 1

    @pytest.mark.parametrize("state", range(256))
    def test_capped_by_num_sections(self, state):
        assert sections_to_compact(state, 4) <= 4

    def test_exact_schedule_prefix(self):
        # Section counts for the first 16 compactions of a fresh buffer:
        # the classic ruler sequence z(C)+1.
        got = [sections_to_compact(c, 10) for c in range(16)]
        assert got == [1, 2, 1, 3, 1, 2, 1, 4, 1, 2, 1, 3, 1, 2, 1, 5]

    def test_section_j_frequency(self):
        """Section j participates in every 2^(j-1)-th compaction (paper §2.1)."""
        N = 1 << 12
        for j in range(1, 8):
            hits = sum(1 for c in range(N) if sections_to_compact(c, 16) >= j)
            assert hits == N // (1 << (j - 1))

    def test_invalid_num_sections(self):
        with pytest.raises(ValueError):
            sections_to_compact(0, 0)

    @pytest.mark.parametrize("num_sections", [1, 2, 5, 16])
    def test_fact4_streaming(self, num_sections):
        """Fact 4: between two compactions with exactly j sections there is
        one with more than j sections (states C = 0, 1, 2, ... in order)."""
        seq = [sections_to_compact(c, num_sections) for c in range(1 << 10)]
        for j in range(1, num_sections):  # cap-level j==num_sections exempt
            last = None
            for t, s in enumerate(seq):
                if s == j:
                    if last is not None:
                        between = seq[last + 1 : t]
                        assert any(b > j for b in between), (j, last, t)
                    last = t


class TestMergeStates:
    @pytest.mark.parametrize("a,b", [(0, 0), (1, 2), (3, 5), (7, 8), (12, 10)])
    def test_is_bitwise_or(self, a, b):
        assert merge_states(a, b) == a | b

    @pytest.mark.parametrize("a,b", [(c1, c2) for c1 in range(8) for c2 in range(8)])
    def test_fact15_one_bits_survive(self, a, b):
        m = merge_states(a, b)
        assert m & a == a and m & b == b

    @pytest.mark.parametrize("a,b", [(c1, c2) for c1 in range(16) for c2 in range(16)])
    def test_fact16_at_most_sum(self, a, b):
        assert merge_states(a, b) <= a + b

    def test_commutative(self):
        for a in range(20):
            for b in range(20):
                assert merge_states(a, b) == merge_states(b, a)

    def test_zero_identity(self):
        for a in range(50):
            assert merge_states(a, 0) == a

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            merge_states(-1, 0)
