"""Coverage-enhancement performance sweeps (T8–T9 ↔ Figures 17–19).

Per setting: DEEPDIVER (level-limited to λ — deeper MUPs cannot affect
M_λ) finds the MUPs, Appendix C expands them to the uncovered patterns
at level λ (the hitting-set input), and GREEDY (and optionally the
naïve greedy) collects value combinations (the output). Input/output
sizes are recorded for T9 (Fig 19).
"""
from __future__ import annotations

from typing import List, Optional, Sequence

from pyspark.sql import SparkSession

from repro.core.coverage import CoverageIndex, TimeBudgetExceeded
from repro.core.deepdiver import mups_deepdiver
from repro.enhance.expand import uncovered_at_level
from repro.enhance.hitting_set import greedy_hitting_set
from repro.enhance.naive_greedy import naive_greedy_hitting_set
from repro.experiments.common import DNF, timed
from repro.experiments.mup_perf import build_airbnb_index


def _one_setting(
    idx: CoverageIndex,
    tau: int,
    lam: int,
    *,
    include_naive: bool,
    time_limit: Optional[float],
    base_row: dict,
) -> List[dict]:
    rows: List[dict] = []
    try:
        mups = mups_deepdiver(idx, tau, max_level=lam, time_limit=time_limit)
        m_lam = sorted(uncovered_at_level(mups, lam, idx.cards))
    except TimeBudgetExceeded:
        # Even the input-set construction blew the budget: report DNF.
        for algo in ["greedy"] + (["naive"] if include_naive else []):
            rows.append(
                {**base_row, "algorithm": algo, "seconds": DNF,
                 "n_input": None, "n_output": None}
            )
        return rows
    secs, combos = timed(
        lambda: greedy_hitting_set(m_lam, idx.cards, time_limit=time_limit)
    )
    rows.append(
        {
            **base_row,
            "algorithm": "greedy",
            "seconds": secs,
            "n_input": len(m_lam),
            "n_output": None if combos is None else len(combos),
        }
    )
    if include_naive:
        secs_n, combos_n = timed(
            lambda: naive_greedy_hitting_set(m_lam, idx.cards, time_limit=time_limit)
        )
        rows.append(
            {
                **base_row,
                "algorithm": "naive",
                "seconds": secs_n,
                "n_input": len(m_lam),
                "n_output": None if combos_n is None else len(combos_n),
            }
        )
    return rows


def enhance_threshold_sweep(
    spark: SparkSession,
    *,
    n: int = 100_000,
    d: int = 13,
    rates: Sequence[float] = (1e-5, 1e-4, 1e-3, 1e-2),
    lams: Sequence[int] = (3, 4, 5),
    include_naive: bool = True,
    time_limit: Optional[float] = 120.0,
) -> List[dict]:
    """T8 (Fig 17): GREEDY vs naïve greedy across threshold rates and λ."""
    idx = build_airbnb_index(spark, n=n, d=d)
    rows: List[dict] = []
    for rate in rates:
        tau = max(1, int(rate * idx.n))
        for lam in lams:
            rows += _one_setting(
                idx, tau, lam,
                include_naive=include_naive,
                time_limit=time_limit,
                base_row={"n": idx.n, "d": d, "rate": rate, "tau": tau, "lam": lam},
            )
    return rows


def enhance_dimensions_sweep(
    spark: SparkSession,
    *,
    n: int = 100_000,
    dims: Sequence[int] = (5, 9, 13, 17),
    lams: Sequence[int] = (3, 4, 5),
    rate: float = 1e-2,
    time_limit: Optional[float] = 120.0,
) -> List[dict]:
    """T9 (Fig 18 runtime + Fig 19 input/output sizes) across d and λ."""
    rows: List[dict] = []
    for d in dims:
        idx = build_airbnb_index(spark, n=n, d=d)
        tau = max(1, int(rate * idx.n))
        for lam in lams:
            if lam > d:
                continue
            rows += _one_setting(
                idx, tau, lam,
                include_naive=False,
                time_limit=time_limit,
                base_row={"n": idx.n, "d": d, "rate": rate, "tau": tau, "lam": lam},
            )
    return rows
