"""CoverageIndex (Appendix A) against the brute-force Definition-2 count."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import brute
from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex, Deadline, TimeBudgetExceeded
from repro.core.patterns import X

EX1_ROWS = [(0, 1, 0), (0, 0, 1), (0, 0, 0), (0, 1, 1), (0, 0, 1)]
EX1_CARDS = [2, 2, 2]


def rows_strategy(max_d=4, max_c=3, max_n=25):
    return st.integers(1, max_d).flatmap(
        lambda d: st.lists(st.integers(2, max_c), min_size=d, max_size=d).flatmap(
            lambda cards: st.tuples(
                st.just(cards),
                st.lists(
                    st.tuples(*[st.integers(0, c - 1) for c in cards]),
                    min_size=1,
                    max_size=max_n,
                ),
            )
        )
    )


def test_appendix_a_worked_example():
    # Appendix A computes cov(0X1) = 3 on Example 1's data.
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert idx.cov(pt.parse("0X1")) == 3


def test_root_coverage_is_n():
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert idx.cov(pt.root(3)) == 5
    assert idx.n == 5


def test_zero_coverage_pattern():
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert idx.cov(pt.parse("1XX")) == 0
    assert idx.cov(pt.parse("111")) == 0


@pytest.mark.parametrize(
    "p",
    ["XXX", "0XX", "1XX", "X1X", "XX1", "01X", "0X0", "010", "001", "111"],
)
def test_example1_patterns_vs_brute(p):
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    pat = pt.parse(p)
    assert idx.cov(pat) == brute.coverage(EX1_ROWS, pat)


@given(rows_strategy())
@settings(max_examples=60, deadline=None)
def test_cov_matches_brute_on_random_data(cr):
    cards, rows = cr
    idx = CoverageIndex.from_rows(rows, cards)
    for p in pt.all_patterns(cards):
        assert idx.cov(p) == brute.coverage(rows, p)


def test_counts_aggregate_duplicates():
    rows = [(0, 0)] * 7 + [(1, 1)] * 3
    idx = CoverageIndex.from_rows(rows, [2, 2])
    assert len(idx.counts) == 2
    assert idx.cov((0, 0)) == 7
    assert idx.cov((X, 1)) == 3


def test_exact_counts():
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert idx.exact_counts() == {
        (0, 1, 0): 1,
        (0, 0, 1): 2,
        (0, 0, 0): 1,
        (0, 1, 1): 1,
    }


def test_value_out_of_cardinality_rejected():
    with pytest.raises(ValueError):
        CoverageIndex.from_rows([(0, 5)], [2, 2])


def test_mismatched_lengths_rejected():
    with pytest.raises(ValueError):
        CoverageIndex(np.array([[0, 0]]), np.array([1, 2]), [2, 2])


def test_from_pandas_matches_from_rows():
    pdf = pd.DataFrame(EX1_ROWS, columns=["a0", "a1", "a2"])
    i1 = CoverageIndex.from_pandas(pdf, ["a0", "a1", "a2"], EX1_CARDS)
    i2 = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    for p in pt.all_patterns(EX1_CARDS):
        assert i1.cov(p) == i2.cov(p)


def test_cov_calls_counter():
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    before = idx.cov_calls
    idx.cov(pt.parse("0X1"))
    idx.cov(pt.parse("XXX"))
    assert idx.cov_calls == before + 2


def test_deadline_unlimited_never_raises():
    d = Deadline(None, stride=1)
    for _ in range(10_000):
        d.check()


def test_deadline_expires():
    d = Deadline(0.0, stride=1)
    with pytest.raises(TimeBudgetExceeded):
        for _ in range(10):
            d.check()
