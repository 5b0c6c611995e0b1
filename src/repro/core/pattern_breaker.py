"""PATTERN-BREAKER — the top-down algorithm (Algorithm 1, §III-C).

Level-by-level BFS from the root ``XX…X``. Covered nodes generate the
next level's candidates under Rule 1, so every node is generated at most
once (Theorem 3). A candidate all of whose parents were covered at the
previous level is a *MUP candidate*: its coverage is evaluated and it is
either a MUP (cov < τ) or covered (and expands). A candidate with any
non-covered parent is uncovered-and-dominated by monotonicity and is
pruned without touching the data.
"""
from __future__ import annotations

from typing import Optional, Set

from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex, Deadline
from repro.core.patterns import Pattern


def mups_pattern_breaker(
    idx: CoverageIndex,
    tau: int,
    *,
    max_level: Optional[int] = None,
    time_limit: Optional[float] = None,
) -> Set[Pattern]:
    """Return all MUPs (restricted to level ≤ ``max_level`` if given)."""
    deadline = Deadline(time_limit)
    d = idx.d
    depth = d if max_level is None else min(d, max_level)
    mups: Set[Pattern] = set()

    r = pt.root(d)
    if idx.cov(r) < tau:
        return {r}

    covered_prev: Set[Pattern] = {r}
    for _ in range(depth):
        if not covered_prev:
            break
        covered_cur: Set[Pattern] = set()
        for parent in covered_prev:
            for cand in pt.rule1_children(parent, idx.cards):
                deadline.check()
                # MUP condition needs *every* parent covered; a missing
                # parent means some ancestor was uncovered -> prune.
                if not all(q in covered_prev for q in pt.parents(cand)):
                    continue
                if idx.cov(cand) < tau:
                    mups.add(cand)
                else:
                    covered_cur.add(cand)
        covered_prev = covered_cur
    return mups
