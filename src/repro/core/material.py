"""Material-MUP annotation support (§II, §I).

Not every MUP is a problem: some value combinations are infeasible
(e.g. age="teen" ∧ education="graduate degree") and a domain expert can
mark them ignorable. A pattern annotated as infeasible renders
non-material every MUP *dominated by* it (anything at or below an
infeasible region is vacuously uncovered). The remaining MUPs are the
material set that Definition 6's maximum covered level and Problem 2's
enhancement operate on.
"""
from __future__ import annotations

from typing import Iterable, Set

from repro.core import patterns as pt
from repro.core.patterns import Pattern


def filter_material(
    mups: Iterable[Pattern], infeasible: Iterable[Pattern]
) -> Set[Pattern]:
    """Drop MUPs dominated by (at or below) any annotated-infeasible pattern."""
    infeasible = list(infeasible)
    return {
        m for m in mups if not any(pt.dominates(q, m) for q in infeasible)
    }
