"""Shared experiment utilities: timing with honest DNF reporting."""
from __future__ import annotations

import time
from typing import Any, Callable, List, Optional, Tuple

from repro.core.coverage import TimeBudgetExceeded

#: Marker recorded in result rows when an algorithm exceeded its budget,
#: mirroring the paper's "did not finish within the time limit" entries.
DNF = None


def timed(fn: Callable[[], Any]) -> Tuple[Optional[float], Any]:
    """Run ``fn``; return (seconds, result), or (DNF, None) on budget excess."""
    t0 = time.perf_counter()
    try:
        out = fn()
    except TimeBudgetExceeded:
        return DNF, None
    return time.perf_counter() - t0, out


def fmt_seconds(s: Optional[float]) -> str:
    return "DNF" if s is DNF else f"{s:.2f}"


def show_rows(rows: List[dict]) -> str:
    """Render result rows as a GitHub-flavoured markdown table."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0].keys())
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        out.append(
            "| "
            + " | ".join(
                "DNF"
                if r[c] is DNF and ("seconds" in c or "time" in c)
                else (f"{r[c]:.3f}" if isinstance(r[c], float) else str(r[c]))
                for c in cols
            )
            + " |"
        )
    return "\n".join(out)
