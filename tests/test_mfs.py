"""Unit tests for maximal frequent set mining (pure driver-side)."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.mfs import frequent_itemsets, maximal_frequent_sets

T = [
    (frozenset({"a", "b", "c"}), 4),
    (frozenset({"a", "b"}), 3),
    (frozenset({"a", "c"}), 2),
    (frozenset({"d"}), 5),
]


def test_singleton_supports():
    freq = frequent_itemsets(T, min_support=5, max_size=3)
    assert freq[frozenset({"a"})] == 9
    assert freq[frozenset({"d"})] == 5


def test_pair_supports():
    freq = frequent_itemsets(T, min_support=5, max_size=3)
    assert freq[frozenset({"a", "b"})] == 7
    assert frozenset({"a", "c"}) in freq  # support 6


def test_infrequent_excluded():
    freq = frequent_itemsets(T, min_support=5, max_size=3)
    assert frozenset({"b", "c"}) not in freq  # support 4 < 5


def test_max_size_bound():
    freq = frequent_itemsets(T, min_support=1, max_size=2)
    assert all(len(s) <= 2 for s in freq)


def test_maximal_sets():
    got = maximal_frequent_sets(T, min_support=5, max_size=3)
    assert frozenset({"a", "b"}) in got
    assert frozenset({"a", "c"}) in got
    assert frozenset({"d"}) in got
    assert frozenset({"a"}) not in got  # subsumed by {a,b}


def test_maximal_with_triple():
    got = maximal_frequent_sets(T, min_support=4, max_size=3)
    assert frozenset({"a", "b", "c"}) in got
    assert frozenset({"a", "b"}) not in got


def test_empty_transactions():
    assert maximal_frequent_sets([], min_support=1, max_size=3) == []


def test_min_support_zero_treated_as_one():
    got = frequent_itemsets(T, min_support=0, max_size=1)
    assert frozenset({"d"}) in got


def test_ordering_larger_first():
    got = maximal_frequent_sets(T, min_support=4, max_size=3)
    sizes = [len(s) for s in got]
    assert sizes == sorted(sizes, reverse=True)


@settings(max_examples=50, deadline=None)
@given(
    st.lists(
        st.tuples(
            st.frozensets(st.sampled_from("abcde"), min_size=1, max_size=4),
            st.integers(1, 5),
        ),
        max_size=8,
    ),
    st.integers(1, 10),
)
def test_property_every_frequent_set_support_correct(transactions, min_support):
    freq = frequent_itemsets(transactions, min_support, max_size=3)
    for items, support in freq.items():
        true = sum(w for t, w in transactions if items <= t)
        assert support == true and true >= min_support


@settings(max_examples=50, deadline=None)
@given(
    st.lists(
        st.tuples(
            st.frozensets(st.sampled_from("abcd"), min_size=1, max_size=4),
            st.integers(1, 3),
        ),
        max_size=6,
    )
)
def test_property_maximal_sets_have_no_frequent_superset(transactions):
    freq = frequent_itemsets(transactions, 2, max_size=3)
    maximal = maximal_frequent_sets(transactions, 2, max_size=3)
    for m in maximal:
        assert not any(m < other for other in freq)
