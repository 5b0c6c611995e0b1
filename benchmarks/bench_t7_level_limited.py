"""T7 bench: level-limited DEEPDIVER at high dimensionality."""
from repro.experiments.mup_perf import level_limited_sweep


def test_bench_t7_level_limited(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: level_limited_sweep(
            spark, n=20_000, dims=(20, 30), rate=1e-2, max_level=2,
            time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 2
