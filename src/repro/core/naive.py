"""Naïve MUP identification (§III-A).

Enumerates all Π (c_i + 1) patterns, computes every coverage through the
:class:`~repro.core.coverage.CoverageIndex` oracle, then removes the
uncovered patterns dominated by another uncovered pattern. This is the
O(c⁺_A + u²) baseline the paper reports as timing out on every
full-scale setting; we keep it for small instances and cross-checks.
"""
from __future__ import annotations

from typing import List, Optional, Set

from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex, Deadline
from repro.core.patterns import Pattern


def mups_naive(
    idx: CoverageIndex, tau: int, *, time_limit: Optional[float] = None
) -> Set[Pattern]:
    """All MUPs by full enumeration + pairwise dominance elimination."""
    deadline = Deadline(time_limit)
    uncovered: List[Pattern] = []
    for p in pt.all_patterns(idx.cards):
        deadline.check()
        if idx.cov(p) < tau:
            uncovered.append(p)
    out: Set[Pattern] = set()
    for p in uncovered:
        deadline.check()
        # A pattern is maximal iff no *other* uncovered pattern dominates it.
        if not any(q != p and pt.dominates(q, p) for q in uncovered):
            out.add(p)
    return out
