"""T8 bench: coverage enhancement (GREEDY) across thresholds."""
from repro.experiments.enhance_perf import enhance_threshold_sweep


def test_bench_t8_enhance_threshold(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: enhance_threshold_sweep(
            spark, n=20_000, d=10, rates=(1e-2,), lams=(2, 3),
            include_naive=False, time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 2
