"""T3 bench: MUP identification across thresholds (AirBnB, scaled down)."""
from repro.experiments.mup_perf import threshold_sweep


def test_bench_t3_airbnb_threshold(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: threshold_sweep(
            spark, dataset="airbnb", n=20_000, d=10,
            rates=(1e-3, 1e-2), time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 6
