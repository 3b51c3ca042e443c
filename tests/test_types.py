"""Explanation predicates and overlap semantics (Def. 3.1 / 3.4)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.types import Explanation, overlaps, pairwise_non_overlapping


class TestExplanation:
    def test_order(self):
        assert Explanation.of(a=1).order == 1
        assert Explanation.of(a=1, b=2).order == 2
        assert Explanation.of(a=1, b=2, c=3).order == 3

    def test_preds_sorted_by_attr(self):
        e = Explanation((("b", 2), ("a", 1)))
        assert e.preds == (("a", 1), ("b", 2))

    def test_equality_independent_of_order(self):
        assert Explanation((("b", 2), ("a", 1))) == Explanation((("a", 1), ("b", 2)))

    def test_hashable_and_equal_hash(self):
        assert hash(Explanation.of(a=1, b=2)) == hash(Explanation((("b", 2), ("a", 1))))

    def test_duplicate_attr_rejected(self):
        with pytest.raises(ValueError):
            Explanation((("a", 1), ("a", 2)))

    def test_label(self):
        assert Explanation.of(state="CA").label == "state=CA"
        assert Explanation((("P", 12), ("BV", 750))).label == "BV=750 & P=12"

    def test_attrs(self):
        assert Explanation.of(b=2, a=1).attrs == ("a", "b")

    def test_as_dict(self):
        assert Explanation.of(a=1, b=2).as_dict() == {"a": 1, "b": 2}

    def test_drop(self):
        e = Explanation.of(a=1, b=2)
        assert e.drop("a") == Explanation.of(b=2)
        assert e.drop("b") == Explanation.of(a=1)

    def test_from_mapping(self):
        assert Explanation.from_mapping({"a": 1}) == Explanation.of(a=1)


OVERLAP_CASES = [
    # (e1 kwargs, e2 kwargs, expected overlap)
    ({"a": 1}, {"a": 1}, True),  # identical
    ({"a": 1}, {"a": 2}, False),  # same attr, different value
    ({"a": 1}, {"b": 1}, True),  # disjoint attrs: may co-occur
    ({"a": 1}, {"a": 1, "b": 2}, True),  # parent/child
    ({"a": 1}, {"a": 2, "b": 2}, False),  # differ on shared attr a
    ({"a": 1, "b": 2}, {"a": 1, "b": 2}, True),
    ({"a": 1, "b": 2}, {"a": 1, "b": 3}, False),
    ({"a": 1, "b": 2}, {"a": 2, "b": 2}, False),
    ({"a": 1, "b": 2}, {"c": 9}, True),
    ({"a": 1, "b": 2}, {"b": 2, "c": 9}, True),
    ({"a": 1, "b": 2}, {"b": 3, "c": 9}, False),
    ({"a": 1, "b": 2, "c": 3}, {"c": 3}, True),
    ({"a": 1, "b": 2, "c": 3}, {"c": 4}, False),
]


@pytest.mark.parametrize("k1,k2,expected", OVERLAP_CASES)
def test_overlaps(k1, k2, expected):
    e1, e2 = Explanation.of(**k1), Explanation.of(**k2)
    assert overlaps(e1, e2) is expected


@pytest.mark.parametrize("k1,k2,expected", OVERLAP_CASES)
def test_overlaps_symmetric(k1, k2, expected):
    e1, e2 = Explanation.of(**k1), Explanation.of(**k2)
    assert overlaps(e1, e2) == overlaps(e2, e1)


def test_pairwise_non_overlapping():
    assert pairwise_non_overlapping(
        [Explanation.of(a=1), Explanation.of(a=2), Explanation.of(a=3)]
    )
    assert not pairwise_non_overlapping(
        [Explanation.of(a=1), Explanation.of(b=1)]
    )
    assert pairwise_non_overlapping([])


@settings(max_examples=50, deadline=None)
@given(
    p1=st.dictionaries(st.sampled_from("abcd"), st.integers(0, 3), min_size=1, max_size=3),
    p2=st.dictionaries(st.sampled_from("abcd"), st.integers(0, 3), min_size=1, max_size=3),
)
def test_overlap_matches_semantic_definition(p1, p2):
    """overlaps == 'a row satisfying both conjunctions can exist'."""
    e1, e2 = Explanation.from_mapping(p1), Explanation.from_mapping(p2)
    joint_consistent = all(p2.get(a, v) == v for a, v in p1.items())
    assert overlaps(e1, e2) == joint_consistent
