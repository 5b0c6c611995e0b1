"""T6 bench: MUP identification across dimensions."""
from repro.experiments.mup_perf import dimensions_sweep


def test_bench_t6_dimensions(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: dimensions_sweep(
            spark, n=20_000, dims=(5, 8), rate=1e-2, time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 6
