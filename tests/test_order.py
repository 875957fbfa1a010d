"""Unit tests for partial orders, antichains and frontier helpers (§3.1)."""
import pytest
from hypothesis import given, strategies as st

from repro.timely.order import Antichain, frontier_min, in_advance_of, less_equal


class TestLessEqual:
    def test_ints(self):
        assert less_equal(1, 2)
        assert less_equal(2, 2)
        assert not less_equal(3, 2)

    def test_tuples_product_order(self):
        assert less_equal((1, 2), (1, 3))
        assert less_equal((1, 2), (2, 2))
        assert not less_equal((1, 3), (2, 2))  # incomparable
        assert not less_equal((2, 2), (1, 3))

    def test_tuple_length_mismatch(self):
        with pytest.raises(TypeError):
            less_equal((1,), (1, 2))


class TestInAdvanceOf:
    def test_timestamp(self):
        # "a time 6 is in advance of 5" (paper Definition 2)
        assert in_advance_of(6, 5)
        assert in_advance_of(5, 5)
        assert not in_advance_of(4, 5)

    def test_frontier(self):
        f = Antichain([5])
        assert in_advance_of(6, f)
        assert in_advance_of(5, f)
        assert not in_advance_of(4, f)


class TestAntichain:
    def test_insert_minimal(self):
        a = Antichain()
        assert a.insert(5)
        assert not a.insert(7)  # dominated
        assert a.insert(3)  # evicts 5
        assert a.elements == [3]

    def test_incomparable_elements_coexist(self):
        a = Antichain([(1, 3), (3, 1)])
        assert sorted(a.elements) == [(1, 3), (3, 1)]
        assert a.less_equal((2, 4))
        assert a.less_equal((4, 2))
        assert not a.less_equal((0, 0))

    def test_definition1_no_element_dominates_another(self):
        a = Antichain([(1, 3), (3, 1), (2, 2), (1, 1)])
        els = a.elements
        for x in els:
            for y in els:
                if x != y:
                    assert not less_equal(x, y)

    def test_less_than_strict(self):
        a = Antichain([5])
        assert not a.less_than(5)
        assert a.less_than(6)

    def test_dominates(self):
        assert Antichain([2]).dominates(Antichain([3]))
        assert not Antichain([4]).dominates(Antichain([3]))

    def test_empty(self):
        a = Antichain()
        assert a.is_empty()
        assert a.min_int() is None
        assert not a.less_equal(10)

    def test_min_int(self):
        assert Antichain([7, 9]).min_int() == 7

    def test_contains_eq_repr(self):
        a = Antichain([4])
        assert 4 in a
        assert a == Antichain([4])
        assert "4" in repr(a)

    @given(st.lists(st.integers(0, 100), max_size=30))
    def test_int_antichain_is_min(self, xs):
        a = Antichain(xs)
        if xs:
            assert a.elements == [min(xs)]
        else:
            assert a.is_empty()

    @given(
        st.lists(
            st.tuples(st.integers(0, 6), st.integers(0, 6)), max_size=25
        ),
        st.tuples(st.integers(0, 6), st.integers(0, 6)),
    )
    def test_less_equal_matches_bruteforce(self, xs, probe):
        a = Antichain(xs)
        expect = any(less_equal(x, probe) for x in xs)
        assert a.less_equal(probe) == expect


class TestFrontierMin:
    def test_plain_min(self):
        assert frontier_min(3, 5) == 3

    def test_none_is_closed(self):
        assert frontier_min(None, 5) == 5
        assert frontier_min(None, None) is None
        assert frontier_min() is None
