"""T1 bench: COMPAS coverage audit (MUP identification at tau=10)."""
from repro import synth_data as sd
from repro.core.coverage import CoverageIndex
from repro.core.deepdiver import mups_deepdiver


def test_bench_t1_compas_audit(benchmark, spark):
    df = sd.compas_like(spark, n=6889).select(*sd.COMPAS_ATTRS)
    idx = CoverageIndex.from_spark(df, sd.COMPAS_ATTRS, sd.COMPAS_CARDS)
    mups = benchmark(lambda: mups_deepdiver(idx, 10))
    assert len(mups) > 0
