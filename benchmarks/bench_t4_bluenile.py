"""T4 bench: MUP identification across thresholds (BlueNile, scaled down)."""
from repro.experiments.mup_perf import threshold_sweep


def test_bench_t4_bluenile_threshold(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: threshold_sweep(
            spark, dataset="bluenile", n=20_000, rates=(1e-3,), time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 3
