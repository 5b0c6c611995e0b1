"""Brute-force reference implementations, used only by tests.

These follow the definitions in §II literally — no pruning, no indices —
so they are the ground truth the optimised algorithms are diffed against.
"""
from __future__ import annotations

from typing import Dict, List, Sequence, Set

from repro.core import patterns as pt
from repro.core.patterns import Pattern


def coverage(rows: Sequence[Sequence[int]], p: Pattern) -> int:
    """cov(P, D) by scanning every tuple (Definition 2)."""
    return sum(1 for t in rows if pt.matches(t, p))


def uncovered_patterns(
    rows: Sequence[Sequence[int]], cards: Sequence[int], tau: int
) -> List[Pattern]:
    """Every pattern with cov < τ, by full enumeration."""
    return [p for p in pt.all_patterns(cards) if coverage(rows, p) < tau]


def mups(rows: Sequence[Sequence[int]], cards: Sequence[int], tau: int) -> Set[Pattern]:
    """Definition 5 applied literally to every pattern."""
    cov: Dict[Pattern, int] = {p: coverage(rows, p) for p in pt.all_patterns(cards)}
    out: Set[Pattern] = set()
    for p, c in cov.items():
        if c >= tau:
            continue
        if all(cov[q] >= tau for q in pt.parents(p)):
            out.add(p)
    return out


def uncovered_at_level(
    rows: Sequence[Sequence[int]], cards: Sequence[int], tau: int, lam: int
) -> Set[Pattern]:
    """All uncovered patterns with level exactly λ (Appendix C ground truth)."""
    return {
        p
        for p in pt.all_patterns(cards)
        if pt.level(p) == lam and coverage(rows, p) < tau
    }


def min_hitting_set_size(patterns_: Sequence[Pattern], cards: Sequence[int]) -> int:
    """Exact minimum hitting-set size by exhaustive search (tiny instances only).

    Searches subsets of value combinations in increasing size; used to
    check the greedy's ln-approximation on hand-sized cases.
    """
    import itertools

    combos = list(pt.all_combos(cards))
    if not patterns_:
        return 0
    for k in range(1, len(patterns_) + 1):
        for subset in itertools.combinations(combos, k):
            if all(any(pt.matches(c, p) for c in subset) for p in patterns_):
                return k
    raise AssertionError("unreachable: full combo set always hits")
