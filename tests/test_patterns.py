"""Unit tests for the pattern abstraction (§II definitions)."""
import itertools

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import patterns as pt
from repro.core.patterns import X


def cards_strategy(max_d=4, max_c=3):
    return st.lists(st.integers(2, max_c), min_size=1, max_size=max_d)


def pattern_strategy(cards):
    return st.tuples(*[st.sampled_from([X] + list(range(c))) for c in cards])


# -- parse / fmt -------------------------------------------------------


@pytest.mark.parametrize(
    "s,expected",
    [
        ("X1X0", (X, 1, X, 0)),
        ("XXX", (X, X, X)),
        ("000", (0, 0, 0)),
        ("10X1", (1, 0, X, 1)),
        ("9X", (9, X)),
    ],
)
def test_parse(s, expected):
    assert pt.parse(s) == expected


@pytest.mark.parametrize("s", ["X1X0", "XXX", "000", "10X1", "2X01"])
def test_fmt_roundtrip(s):
    assert pt.fmt(pt.parse(s)) == s


def test_fmt_rejects_multidigit():
    with pytest.raises(ValueError):
        pt.fmt((11,))


# -- level / root / matches -------------------------------------------


@pytest.mark.parametrize(
    "p,lvl", [("XXXX", 0), ("1XXX", 1), ("10X1", 3), ("1011", 4)]
)
def test_level(p, lvl):
    assert pt.level(pt.parse(p)) == lvl


def test_root():
    assert pt.root(3) == (X, X, X)
    assert pt.level(pt.root(5)) == 0


def test_matches_paper_example():
    # §II: P = X1X0; t1=1100, t2=0110 match; t3=1010 does not.
    p = pt.parse("X1X0")
    assert pt.matches((1, 1, 0, 0), p)
    assert pt.matches((0, 1, 1, 0), p)
    assert not pt.matches((1, 0, 1, 0), p)


def test_matches_root_matches_everything():
    for t in itertools.product(range(3), repeat=3):
        assert pt.matches(t, pt.root(3))


# -- value count (Definition 7) ---------------------------------------


def test_value_count_paper_example():
    # §II: P=X1X0 over binary attrs -> A_P={A1,A3}, count 4.
    assert pt.value_count(pt.parse("X1X0"), [2, 2, 2, 2]) == 4


@pytest.mark.parametrize(
    "p,cards,expected",
    [
        ("XXX", [3, 3, 3], 27),
        ("1XX", [3, 3, 3], 9),
        ("111", [3, 3, 3], 1),
        ("X2X", [2, 3, 5], 10),
    ],
)
def test_value_count(p, cards, expected):
    assert pt.value_count(pt.parse(p), cards) == expected


@given(cards_strategy().flatmap(lambda c: st.tuples(st.just(c), pattern_strategy(c))))
def test_value_count_equals_enumerated_matches(cp):
    cards, p = cp
    n_match = sum(1 for t in itertools.product(*[range(c) for c in cards]) if pt.matches(t, p))
    assert pt.value_count(p, cards) == n_match


# -- dominance ---------------------------------------------------------


def test_dominates_paper_example():
    # §II: P2 = 10X1 is dominated by P1 = 1XXX.
    assert pt.dominates(pt.parse("1XXX"), pt.parse("10X1"))
    assert not pt.dominates(pt.parse("10X1"), pt.parse("1XXX"))


def test_dominates_reflexive():
    p = pt.parse("1X0")
    assert pt.dominates(p, p)


def test_x_does_not_dominate_value_mismatch():
    assert not pt.dominates(pt.parse("1XX"), pt.parse("0XX"))
    # X in the specific pattern where general is deterministic -> superset.
    assert not pt.dominates(pt.parse("1XX"), pt.parse("XXX"))


@given(
    cards_strategy().flatmap(
        lambda c: st.tuples(st.just(c), pattern_strategy(c), pattern_strategy(c))
    )
)
@settings(max_examples=60)
def test_dominates_iff_match_subset(cpq):
    cards, p, q = cpq
    match_p = {t for t in itertools.product(*[range(c) for c in cards]) if pt.matches(t, p)}
    match_q = {t for t in itertools.product(*[range(c) for c in cards]) if pt.matches(t, q)}
    assert pt.dominates(p, q) == (match_q <= match_p)


# -- parents / children (Definition 4) ---------------------------------


def test_parents_children_small():
    p = pt.parse("1X0")
    assert set(pt.parents(p)) == {pt.parse("XX0"), pt.parse("1XX")}
    assert set(pt.children(p, [2, 2, 2])) == {pt.parse("100"), pt.parse("110")}


def test_root_has_no_parent_leaf_no_child():
    assert list(pt.parents(pt.root(3))) == []
    assert list(pt.children((0, 1, 0), [2, 2, 2])) == []


@given(cards_strategy().flatmap(lambda c: st.tuples(st.just(c), pattern_strategy(c))))
def test_parent_child_inverse(cp):
    cards, p = cp
    for parent in pt.parents(p):
        assert pt.level(parent) == pt.level(p) - 1
        assert p in set(pt.children(parent, cards))
        assert pt.dominates(parent, p)


# -- Rule 1 (Theorem 3) ------------------------------------------------


def test_rule1_paper_example():
    # §III-C: 0XX (rightmost det = pos 0) generates 0X0, 0X1, 00X, 01X;
    # X1X generates X10 and X11 only.
    assert set(pt.rule1_children(pt.parse("0XX"), [2, 2, 2])) == {
        pt.parse("00X"), pt.parse("01X"), pt.parse("0X0"), pt.parse("0X1")
    }
    assert set(pt.rule1_children(pt.parse("X1X"), [2, 2, 2])) == {
        pt.parse("X10"), pt.parse("X11")
    }


@given(cards_strategy(max_d=4, max_c=3))
@settings(max_examples=30)
def test_rule1_generates_each_pattern_exactly_once(cards):
    """Theorem 3: over the whole graph, every non-root node is generated
    by exactly one parent under Rule 1."""
    generated = []
    for p in pt.all_patterns(cards):
        generated.extend(pt.rule1_children(p, cards))
    non_root = [p for p in pt.all_patterns(cards) if pt.level(p) > 0]
    assert sorted(generated) == sorted(non_root)


@given(cards_strategy().flatmap(lambda c: st.tuples(st.just(c), pattern_strategy(c))))
def test_rule1_generator_is_inverse(cp):
    cards, p = cp
    if pt.level(p) == 0:
        return
    gen = pt.rule1_generator(p)
    assert p in set(pt.rule1_children(gen, cards))


def test_rule1_generator_root_raises():
    with pytest.raises(ValueError):
        pt.rule1_generator(pt.root(2))


# -- Rule 2 (Theorem 4) ------------------------------------------------


def test_rule2_paper_examples():
    # §III-D: X01 generates XX1; 000 generates 00X, 0X0, X00.
    assert set(pt.rule2_parents(pt.parse("X01"))) == {pt.parse("XX1")}
    assert set(pt.rule2_parents(pt.parse("000"))) == {
        pt.parse("00X"), pt.parse("0X0"), pt.parse("X00")
    }


@given(cards_strategy(max_d=4, max_c=3))
@settings(max_examples=30)
def test_rule2_generates_each_non_leaf_exactly_once(cards):
    """Theorem 4: every node with at least one X is generated by exactly
    one child under Rule 2."""
    generated = []
    for p in pt.all_patterns(cards):
        generated.extend(pt.rule2_parents(p))
    d = len(cards)
    non_leaf = [p for p in pt.all_patterns(cards) if pt.level(p) < d]
    assert sorted(generated) == sorted(non_leaf)


@given(cards_strategy().flatmap(lambda c: st.tuples(st.just(c), pattern_strategy(c))))
def test_rule2_generator_is_inverse(cp):
    cards, p = cp
    if pt.level(p) == len(cards):
        return
    gen = pt.rule2_generator(p)
    assert p in set(pt.rule2_parents(gen))


# -- enumeration helpers ----------------------------------------------


@pytest.mark.parametrize("cards", [[2, 2], [2, 3], [3, 3, 2]])
def test_all_patterns_count(cards):
    expected = 1
    for c in cards:
        expected *= c + 1
    assert len(list(pt.all_patterns(cards))) == expected


@pytest.mark.parametrize("cards", [[2, 2], [2, 3], [3, 3, 2]])
def test_all_combos_count(cards):
    expected = 1
    for c in cards:
        expected *= c
    combos = list(pt.all_combos(cards))
    assert len(combos) == expected
    assert all(pt.level(c) == len(cards) for c in combos)


def test_pattern_graph_node_count_fig2():
    # Figure 2: three binary attributes -> 27 nodes.
    assert len(list(pt.all_patterns([2, 2, 2]))) == 27


def test_descendants_at_level_appendix_c():
    # Appendix C: subset patterns of P1=XX01X at level 3 over
    # cards [2,3,3,2,2] (A2, A3 ternary).
    cards = [2, 3, 3, 2, 2]
    p1 = pt.parse("XX01X")
    got = set(pt.descendants_at_level(p1, 3, cards))
    expected = {
        pt.parse(s)
        for s in ["0X01X", "1X01X", "X001X", "X101X", "X201X", "XX010", "XX011"]
    }
    assert got == expected


def test_descendants_at_level_self():
    p = pt.parse("1X0")
    assert set(pt.descendants_at_level(p, 2, [2, 2, 2])) == {p}


def test_descendants_at_level_below_raises():
    with pytest.raises(ValueError):
        list(pt.descendants_at_level(pt.parse("10X"), 1, [2, 2, 2]))


# -- covered level -----------------------------------------------------


def test_max_covered_level():
    mups = {pt.parse("XX23"), pt.parse("1X2X")}
    assert pt.min_level(mups, 4) == 2
    assert pt.max_covered_level(mups, 4) == 1
    assert pt.max_covered_level(set(), 4) == 4
