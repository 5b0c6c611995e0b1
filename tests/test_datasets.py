"""Synthetic dataset generators: determinism, schema, and the sparsity
structure the experiments rely on (DESIGN.md §3 substitutions)."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex


# -- COMPAS ------------------------------------------------------------


def test_compas_schema():
    pdf = sd.compas_like_pdf()
    assert list(pdf.columns) == sd.COMPAS_ATTRS + ["reoffend"]
    assert len(pdf) == 6889
    for a, c in zip(sd.COMPAS_ATTRS, sd.COMPAS_CARDS):
        assert pdf[a].between(0, c - 1).all()
    assert set(pdf.reoffend.unique()) <= {0, 1}


def test_compas_deterministic():
    a = sd.compas_like_pdf(seed=7)
    b = sd.compas_like_pdf(seed=7)
    pd.testing.assert_frame_equal(a, b)
    c = sd.compas_like_pdf(seed=8)
    assert not a.equals(c)


def test_compas_single_values_covered_at_tau10():
    """§V-B.1: every single attribute value exceeds the threshold 10."""
    pdf = sd.compas_like_pdf()
    idx = CoverageIndex.from_pandas(pdf, sd.COMPAS_ATTRS, sd.COMPAS_CARDS)
    for i, c in enumerate(sd.COMPAS_CARDS):
        for v in range(c):
            p = tuple(v if j == i else pt.X for j in range(4))
            assert idx.cov(p) >= 10, f"value {v} of {sd.COMPAS_ATTRS[i]} uncovered"


def test_compas_widowed_hispanic_sparse():
    """The paper's XX23 pattern: very few widowed Hispanics."""
    pdf = sd.compas_like_pdf()
    n = len(pdf[(pdf.race == 2) & (pdf.marital == 3)])
    assert 1 <= n < 10


def test_compas_hf_minority_size():
    """~100 Hispanic females, matching the paper's subgroup size."""
    pdf = sd.compas_like_pdf()
    n = len(pdf[(pdf.race == 2) & (pdf.sex == 1)])
    assert 90 <= n <= 130


# -- AirBnB ------------------------------------------------------------


def test_airbnb_schema_and_bounds():
    pdf = sd.airbnb_like_pdf(n=2000, d=10)
    assert list(pdf.columns) == sd.airbnb_attrs(10)
    assert pdf.shape == (2000, 10)
    assert pdf.isin([0, 1]).all().all()


def test_airbnb_deterministic_and_prefix_stable():
    """Same seed -> same data; smaller d is a projection of larger d
    (the paper projects one dataset down to fewer attributes)."""
    a = sd.airbnb_like_pdf(n=500, d=8, seed=3)
    b = sd.airbnb_like_pdf(n=500, d=8, seed=3)
    pd.testing.assert_frame_equal(a, b)


def test_airbnb_d_validation():
    with pytest.raises(ValueError):
        sd.airbnb_like_pdf(n=10, d=0)
    with pytest.raises(ValueError):
        sd.airbnb_like_pdf(n=10, d=37)


def test_airbnb_attribute_skew():
    """Rates must be spread out (some rare amenities) for uncovered
    regions to exist."""
    pdf = sd.airbnb_like_pdf(n=20_000, d=30)
    rates = pdf.mean().to_numpy()
    assert rates.min() < 0.15
    assert rates.max() > 0.5


def test_airbnb_has_uncovered_structure():
    from repro.core.deepdiver import mups_deepdiver

    pdf = sd.airbnb_like_pdf(n=5000, d=8)
    idx = CoverageIndex.from_pandas(pdf, sd.airbnb_attrs(8), [2] * 8)
    mups = mups_deepdiver(idx, max(1, int(0.001 * len(pdf))))
    assert len(mups) > 0


# -- BlueNile ----------------------------------------------------------


def test_bluenile_schema():
    pdf = sd.bluenile_like_pdf(n=5000)
    assert list(pdf.columns) == sd.BLUENILE_ATTRS
    for a, c in zip(sd.BLUENILE_ATTRS, sd.BLUENILE_CARDS):
        assert pdf[a].between(0, c - 1).all()


def test_bluenile_deterministic():
    a = sd.bluenile_like_pdf(n=1000, seed=13)
    b = sd.bluenile_like_pdf(n=1000, seed=13)
    pd.testing.assert_frame_equal(a, b)


def test_bluenile_cardinality_matches_paper():
    assert sd.BLUENILE_CARDS == [10, 4, 7, 8, 3, 3, 5]
    total = int(np.prod(sd.BLUENILE_CARDS))
    assert total == 100_800  # >100K bottom-level nodes (§V-C.1)


def test_bluenile_skew():
    pdf = sd.bluenile_like_pdf(n=20_000)
    # Long tails: rarest shape well below uniform share.
    share = pdf["shape"].value_counts(normalize=True)
    assert share.min() < 0.07  # rarest shape well below the uniform 1/10
    assert share.max() > 0.13  # and some shape clearly over-represented


# -- Spark wrappers ----------------------------------------------------


def test_compas_spark(spark):
    df = sd.compas_like(spark, n=500)
    assert df.count() == 500
    assert set(sd.COMPAS_ATTRS) <= set(df.columns)


def test_airbnb_spark_partitioned(spark):
    df = sd.airbnb_like(spark, n=1000, d=6)
    assert df.count() == 1000
    assert df.rdd.getNumPartitions() > 1


def test_bluenile_spark(spark):
    df = sd.bluenile_like(spark, n=1000)
    assert df.count() == 1000
    assert set(df.columns) == set(sd.BLUENILE_ATTRS)
