"""Unit tests for combiner operators (paper §IV-B)."""
import pytest

from repro.core.combiners import Counter, Difference, Intersect, Union


# --- Intersect ----------------------------------------------------------

def test_intersect_basic():
    assert Intersect(k=10).apply([[1, 2, 3], [3, 2, 9]]) == [2, 3]


def test_intersect_ordering_follows_first_input():
    assert Intersect(k=10).apply([[5, 1, 7], [7, 5]]) == [5, 7]


def test_intersect_three_inputs():
    assert Intersect(k=10).apply([[1, 2, 3, 4], [2, 3, 4], [4, 2]]) == [2, 4]


def test_intersect_disjoint():
    assert Intersect(k=10).apply([[1], [2]]) == []


def test_intersect_k_truncates():
    assert Intersect(k=1).apply([[1, 2, 3], [1, 2, 3]]) == [1]


def test_intersect_empty_inputs_list():
    assert Intersect(k=5).apply([]) == []


def test_intersect_with_empty_member():
    assert Intersect(k=5).apply([[1, 2], []]) == []


def test_intersect_single_input():
    assert Intersect(k=5).apply([[3, 1]]) == [3, 1]


# --- Union --------------------------------------------------------------

def test_union_first_seen_order():
    assert Union(k=10).apply([[1, 2], [2, 3], [4]]) == [1, 2, 3, 4]


def test_union_k_truncates():
    assert Union(k=2).apply([[1], [2], [3]]) == [1, 2]


def test_union_empty():
    assert Union(k=3).apply([[], []]) == []


def test_union_dedupes():
    assert Union(k=10).apply([[1, 1, 2], [1]]) == [1, 2]


# --- Difference ---------------------------------------------------------

def test_difference_basic():
    assert Difference(k=10).apply([[1, 2, 3], [2]]) == [1, 3]


def test_difference_preserves_first_order():
    assert Difference(k=10).apply([[9, 4, 7], [4]]) == [9, 7]


def test_difference_empty_subtrahend():
    assert Difference(k=10).apply([[1, 2], []]) == [1, 2]


def test_difference_everything_removed():
    assert Difference(k=10).apply([[1, 2], [1, 2, 3]]) == []


def test_difference_requires_two_inputs():
    with pytest.raises(AssertionError):
        Difference(k=5).apply([[1], [2], [3]])


def test_difference_k_truncates():
    assert Difference(k=1).apply([[1, 2, 3], []]) == [1]


# --- Counter ------------------------------------------------------------

def test_counter_frequency_order():
    out = Counter(k=10).apply([[1, 2], [2, 3], [2, 1]])
    assert out[0] == 2  # appears 3x
    assert set(out) == {1, 2, 3}


def test_counter_tie_break_by_tableid():
    # 1 and 2 both appear twice -> lower TableId first (matches the in-DB
    # push-down ORDER BY cnt DESC, TableId ASC)
    assert Counter(k=10).apply([[2, 1], [1, 2]]) == [1, 2]


def test_counter_k_truncates():
    assert len(Counter(k=2).apply([[1], [2], [3]])) == 2


def test_counter_single_input():
    assert Counter(k=5).apply([[7, 3]]) == [3, 7]  # equal counts -> id asc


def test_counter_empty():
    assert Counter(k=5).apply([[], []]) == []


@pytest.mark.parametrize("comb", [Intersect, Union, Difference, Counter])
def test_type_names(comb):
    assert comb(k=1).type_name in {"Intersect", "Union", "Difference", "Counter"}


@pytest.mark.parametrize("comb", [Intersect, Union, Counter])
def test_idempotent_on_duplicated_inputs(comb):
    a = [4, 2, 9]
    out = comb(k=10).apply([a, a])
    assert set(out) == set(a)
