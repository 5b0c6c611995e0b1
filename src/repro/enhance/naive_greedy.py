"""Direct implementation of the greedy hitting-set approximation.

This is the §V-C "naïve" baseline: each round scans *every* value
combination in the Π c_i cross product, counts the still-unhit patterns
it matches by testing each pattern, and collects the argmax. The paper
reports it finishing within the time limit in exactly one setting; our
``time_limit`` reproduces those DNFs honestly.
"""
from __future__ import annotations

from typing import List, Optional, Sequence

from repro.core import patterns as pt
from repro.core.coverage import Deadline
from repro.core.patterns import Pattern


def naive_greedy_hitting_set(
    patterns: Sequence[Pattern],
    cards: Sequence[int],
    *,
    time_limit: Optional[float] = None,
) -> List[Pattern]:
    """Greedy hitting set without indices or pruning."""
    deadline = Deadline(time_limit)
    remaining = list(patterns)
    out: List[Pattern] = []
    while remaining:
        best_cnt, best = 0, None
        for combo in pt.all_combos(cards):
            deadline.check()
            cnt = sum(1 for p in remaining if pt.matches(combo, p))
            if cnt > best_cnt:
                best_cnt, best = cnt, combo
        if best is None:
            raise AssertionError("no combination hits the remaining patterns")
        out.append(best)
        remaining = [p for p in remaining if not pt.matches(best, p)]
    return out
