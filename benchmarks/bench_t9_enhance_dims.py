"""T9 bench: coverage enhancement across dimensions."""
from repro.experiments.enhance_perf import enhance_dimensions_sweep


def test_bench_t9_enhance_dims(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: enhance_dimensions_sweep(
            spark, n=20_000, dims=(6, 10), lams=(2, 3), rate=1e-2,
            time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 4
