"""The three MUP-identification algorithms vs the brute-force ground
truth: the paper's worked examples, its two hardness constructions, and
hypothesis-generated random datasets."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import brute
from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex, TimeBudgetExceeded
from repro.core.deepdiver import mups_deepdiver
from repro.core.naive import mups_naive
from repro.core.pattern_breaker import mups_pattern_breaker
from repro.core.pattern_combiner import mups_pattern_combiner

ALGOS = [mups_naive, mups_pattern_breaker, mups_pattern_combiner, mups_deepdiver]
ALGO_IDS = ["naive", "pattern_breaker", "pattern_combiner", "deepdiver"]

EX1_ROWS = [(0, 1, 0), (0, 0, 1), (0, 0, 0), (0, 1, 1), (0, 0, 1)]
EX1_CARDS = [2, 2, 2]


def rows_strategy(max_d=4, max_c=3, max_n=20):
    return st.integers(1, max_d).flatmap(
        lambda d: st.lists(st.integers(2, max_c), min_size=d, max_size=d).flatmap(
            lambda cards: st.tuples(
                st.just(cards),
                st.lists(
                    st.tuples(*[st.integers(0, c - 1) for c in cards]),
                    min_size=1,
                    max_size=max_n,
                ),
                st.integers(1, 5),
            )
        )
    )


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
def test_example1(algo):
    """Example 1: τ=1 -> the single MUP is 1XX."""
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert algo(idx, 1) == {pt.parse("1XX")}


def test_example1_uncovered_count():
    """§III-A: Example 1 has 9 uncovered patterns, 8 dominated by 1XX."""
    uncovered = brute.uncovered_patterns(EX1_ROWS, EX1_CARDS, 1)
    assert len(uncovered) == 9
    assert set(uncovered) >= {pt.parse(s) for s in
                              ["1XX", "1X0", "1X1", "10X", "11X", "100", "101", "110", "111"]}


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
@pytest.mark.parametrize("tau", [1, 2, 3, 6])
def test_example1_all_thresholds(algo, tau):
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert algo(idx, tau) == brute.mups(EX1_ROWS, EX1_CARDS, tau)


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
def test_all_covered_returns_empty(algo):
    rows = [(v1, v2) for v1 in range(2) for v2 in range(2)] * 3
    idx = CoverageIndex.from_rows(rows, [2, 2])
    assert algo(idx, 3) == set()


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
def test_root_uncovered(algo):
    """τ above n: the root itself is the only MUP."""
    idx = CoverageIndex.from_rows(EX1_ROWS, EX1_CARDS)
    assert algo(idx, 6) == {pt.root(3)}


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
@pytest.mark.parametrize("n", [4, 6, 8])
def test_theorem1_diagonal_construction(algo, n):
    """Theorem 1: the diagonal dataset with τ=n/2+1 has n singleton MUPs
    with value 1 plus C(n, n/2) all-zero MUPs at level n/2."""
    import math

    rows = [tuple(1 if j == i else 0 for j in range(n)) for i in range(n)]
    idx = CoverageIndex.from_rows(rows, [2] * n)
    tau = n // 2 + 1
    mups = algo(idx, tau)
    expected_count = n + math.comb(n, n // 2)
    assert len(mups) == expected_count
    singles = {p for p in mups if pt.level(p) == 1}
    assert len(singles) == n
    assert all(1 in p for p in singles)
    deep = mups - singles
    assert all(pt.level(p) == n // 2 and set(p) <= {0, pt.X} for p in deep)


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
def test_theorem2_vertex_cover_reduction(algo):
    """Theorem 2's reduction on the triangle graph: 3 vertices, 3 edges.

    d = |E| = 3 attributes, one item per vertex with 1s on incident
    edges, plus three all-zero items; τ=3. The MUPs must be exactly the
    three singleton value-1 patterns (one per edge)."""
    #   vertices a,b,c; edges e0=(a,b), e1=(b,c), e2=(a,c)
    rows = [
        (1, 0, 1),  # a
        (1, 1, 0),  # b
        (0, 1, 1),  # c
        (0, 0, 0),
        (0, 0, 0),
        (0, 0, 0),
    ]
    idx = CoverageIndex.from_rows(rows, [2, 2, 2])
    mups = algo(idx, 3)
    assert mups == {pt.parse("1XX"), pt.parse("X1X"), pt.parse("XX1")}


@pytest.mark.parametrize("algo", ALGOS, ids=ALGO_IDS)
def test_ternary_attributes(algo):
    rows = [(0, 0), (0, 1), (0, 2), (1, 0), (2, 2), (2, 2)]
    cards = [3, 3]
    for tau in (1, 2, 3):
        idx = CoverageIndex.from_rows(rows, cards)
        assert algo(idx, tau) == brute.mups(rows, cards, tau)


@given(rows_strategy())
@settings(max_examples=80, deadline=None)
def test_random_agreement_with_brute(crt):
    cards, rows, tau = crt
    expected = brute.mups(rows, cards, tau)
    idx = CoverageIndex.from_rows(rows, cards)
    assert mups_pattern_breaker(idx, tau) == expected
    assert mups_pattern_combiner(idx, tau) == expected
    assert mups_deepdiver(idx, tau) == expected
    assert mups_naive(idx, tau) == expected


@given(rows_strategy())
@settings(max_examples=40, deadline=None)
def test_mups_are_mutually_non_dominating(crt):
    """Definition 5 sanity: no MUP dominates another."""
    cards, rows, tau = crt
    idx = CoverageIndex.from_rows(rows, cards)
    mups = sorted(mups_deepdiver(idx, tau))
    for i, p in enumerate(mups):
        for q in mups[i + 1 :]:
            assert not pt.dominates(p, q)
            assert not pt.dominates(q, p)


@pytest.mark.parametrize(
    "algo", [mups_pattern_breaker, mups_deepdiver], ids=["pattern_breaker", "deepdiver"]
)
@pytest.mark.parametrize("max_level", [0, 1, 2, 3])
def test_max_level_restriction(algo, max_level):
    """Level-limited search returns exactly the MUPs at level ≤ L."""
    rows = [(0, 1, 0), (0, 0, 1), (1, 1, 1), (0, 0, 0)]
    cards = [2, 2, 2]
    for tau in (1, 2, 3):
        full = brute.mups(rows, cards, tau)
        idx = CoverageIndex.from_rows(rows, cards)
        got = algo(idx, tau, max_level=max_level)
        assert got == {p for p in full if pt.level(p) <= max_level}


@pytest.mark.parametrize(
    "algo",
    [mups_naive, mups_pattern_breaker, mups_pattern_combiner, mups_deepdiver],
    ids=ALGO_IDS,
)
def test_time_limit_raises(algo):
    """A zero budget must surface as TimeBudgetExceeded, not bad output."""
    rows = [tuple((i >> j) & 1 for j in range(8)) for i in range(200)]
    idx = CoverageIndex.from_rows(rows, [2] * 8)
    with pytest.raises(TimeBudgetExceeded):
        algo(idx, 5, time_limit=0.0)


def test_deepdiver_matches_breaker_medium_instance():
    """A denser 6-attribute instance exercising the dominance index."""
    import numpy as np

    g = np.random.default_rng(0)
    rows = [tuple(int(v) for v in g.integers(0, 2, 6)) for _ in range(300)]
    cards = [2] * 6
    idx = CoverageIndex.from_rows(rows, cards)
    for tau in (2, 10, 40):
        assert mups_deepdiver(idx, tau) == mups_pattern_breaker(idx, tau)
        assert mups_pattern_combiner(idx, tau) == mups_pattern_breaker(idx, tau)
