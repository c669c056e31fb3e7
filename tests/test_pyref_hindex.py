"""Unit tests for the reference Hirsch-index ℋ(·) (paper §4.1)."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.pyref.hindex import h_index


@pytest.mark.parametrize(
    ("values", "expected"),
    [
        ([], 0),
        ([0], 0),
        ([1], 1),
        ([5], 1),
        ([1, 1], 1),
        ([2, 2], 2),
        ([3, 3, 3], 3),
        ([10, 8, 5, 4, 3], 4),
        ([25, 8, 5, 3, 3], 3),
        ([0, 0, 0, 0], 0),
        ([1, 2, 3, 4, 5], 3),
        ([4, 4, 4, 4, 4, 4], 4),
        ([9, 9, 9, 9, 9, 9, 9, 9, 9, 9], 9),
        ([2, 0, 2, 0, 2], 2),
    ],
)
def test_known_values(values, expected):
    assert h_index(values) == expected


def test_accepts_generators():
    assert h_index(v for v in [3, 3, 3]) == 3


class TestHIndexProperties:
    @given(st.lists(st.integers(0, 50), max_size=40))
    def test_definition(self, values):
        """ℋ is the largest y with at least y values >= y."""
        y = h_index(values)
        assert sum(1 for v in values if v >= y) >= y or y == 0
        assert sum(1 for v in values if v >= y + 1) < y + 1

    @given(st.lists(st.integers(0, 50), max_size=40))
    def test_bounded_by_count_and_max(self, values):
        assert h_index(values) <= len(values)
        assert h_index(values) <= max(values, default=0)

    @given(st.lists(st.integers(0, 50), max_size=30), st.integers(0, 50))
    def test_monotone_in_extension(self, values, extra):
        """Adding a value never lowers ℋ (used implicitly by Theorem 1)."""
        assert h_index(values + [extra]) >= h_index(values)

    @given(st.lists(st.integers(0, 30), max_size=25))
    def test_pointwise_monotone(self, values):
        """Lowering members never raises ℋ — the heart of monotonicity."""
        lowered = [max(0, v - 1) for v in values]
        assert h_index(lowered) <= h_index(values)

    @given(st.lists(st.integers(0, 50), max_size=40))
    def test_permutation_invariant(self, values):
        assert h_index(list(reversed(values))) == h_index(values)
