"""T5 bench: MUP identification across data sizes."""
from repro.experiments.mup_perf import datasize_sweep


def test_bench_t5_datasize(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: datasize_sweep(
            spark, sizes=(5000, 20_000), d=10, rate=1e-2, time_limit=60.0,
        ),
        rounds=1, iterations=1,
    )
    assert len(rows) == 6
