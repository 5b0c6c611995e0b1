"""DEEPDIVER — fast search-space pruner (Algorithm 3, §III-E).

DFS over the Rule-1 tree. When the dive crosses into an uncovered node
it *climbs*: repeatedly moves to any uncovered parent until every parent
is covered — that node is a MUP. Discovered MUPs prune the rest of the
search through the Appendix-B dominance index: nodes dominated by a MUP
are skipped outright; nodes dominating a MUP are known covered (every
ancestor of a MUP is covered by monotonicity) and expand without
touching the coverage oracle.
"""
from __future__ import annotations

from typing import Dict, Optional, Set

from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex, Deadline
from repro.core.mup_index import MupIndex
from repro.core.patterns import Pattern


def mups_deepdiver(
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
    mindex = MupIndex(idx.cards)
    # Coverage memo: the climb re-examines parents shared across dives.
    memo: Dict[Pattern, int] = {}

    def cov(p: Pattern) -> int:
        c = memo.get(p)
        if c is None:
            c = idx.cov(p)
            memo[p] = c
        return c

    def climb(p: Pattern) -> Pattern:
        """Walk up from an uncovered node to a MUP (all parents covered)."""
        while True:
            deadline.check()
            nxt = None
            for parent in pt.parents(p):
                if cov(parent) < tau:
                    nxt = parent
                    break
            if nxt is None:
                return p
            p = nxt

    stack = [pt.root(d)]
    while stack:
        deadline.check()
        p = stack.pop()
        if mindex.dominated_by_any(p):
            continue
        if mindex.dominates_any(p):
            covered = True  # every ancestor of a MUP is covered
        else:
            covered = cov(p) >= tau
        if covered:
            if pt.level(p) < depth:
                stack.extend(pt.rule1_children(p, idx.cards))
        else:
            mindex.add(climb(p))
    return set(mindex.mups)
