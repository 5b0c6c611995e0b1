"""End-to-end coverage enhancement through Spark (Problem 2).

Identify MUPs from a Spark scan, expand to level λ, run GREEDY, union
the collected tuples back into the DataFrame, and verify the maximum
covered level reached λ — the full §IV pipeline on real dataflow.
"""
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex
from repro.core.deepdiver import mups_deepdiver
from repro.enhance.apply import append_collected, combos_to_pandas, verify_covered_level
from repro.enhance.expand import uncovered_at_level
from repro.enhance.hitting_set import greedy_hitting_set


def test_combos_to_pandas_replication():
    out = combos_to_pandas([(0, 1), (1, 1)], ["a", "b"], tau=3)
    assert len(out) == 6
    assert (out.groupby(["a", "b"]).size() == 3).all()


def test_combos_to_pandas_empty():
    out = combos_to_pandas([], ["a", "b"], tau=3)
    assert out.empty


def test_append_collected_counts(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": [0, 1], "b": [1, 0]}))
    out = append_collected(spark, df, [(1, 1)], ["a", "b"], tau=4)
    assert out.count() == 6
    assert out.where("a = 1 AND b = 1").count() == 4


def test_append_collected_noop(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": [0, 1], "b": [1, 0]}))
    assert append_collected(spark, df, [], ["a", "b"], tau=4).count() == 2


@pytest.mark.parametrize("lam", [1, 2])
def test_enhancement_end_to_end_compas(spark, lam):
    """After enhancement at level λ, no material MUP remains at ≤ λ."""
    attrs, cards = sd.COMPAS_ATTRS, sd.COMPAS_CARDS
    tau = 10
    df = sd.compas_like(spark, n=2000, seed=5).select(*attrs)
    idx = CoverageIndex.from_spark(df, attrs, cards)
    before = verify_covered_level(df, attrs, cards, tau)
    mups = mups_deepdiver(idx, tau, max_level=lam)
    pats = sorted(uncovered_at_level(mups, lam, cards))
    combos = greedy_hitting_set(pats, cards)
    enhanced = append_collected(spark, df, combos, attrs, tau)
    after = verify_covered_level(enhanced, attrs, cards, tau)
    assert after >= lam
    assert after >= before
    # Output is a hitting set: strictly fewer combos than patterns when
    # any combination hits more than one pattern.
    assert len(combos) <= max(1, len(pats))


def test_enhancement_output_smaller_than_input_airbnb(spark):
    """Fig 19's qualitative claim: |output| << |input| because each
    combination hits many patterns."""
    d, lam = 8, 3
    attrs, cards = sd.airbnb_attrs(d), [2] * d
    df = sd.airbnb_like(spark, n=20_000, d=d)
    tau = max(1, int(0.01 * 20_000))
    idx = CoverageIndex.from_spark(df, attrs, cards)
    mups = mups_deepdiver(idx, tau, max_level=lam)
    pats = sorted(uncovered_at_level(mups, lam, cards))
    if len(pats) < 5:
        pytest.skip("instance too covered to be meaningful")
    combos = greedy_hitting_set(pats, cards)
    assert len(combos) < len(pats)
    enhanced = append_collected(spark, df, combos, attrs, tau)
    assert verify_covered_level(enhanced, attrs, cards, tau) >= lam
