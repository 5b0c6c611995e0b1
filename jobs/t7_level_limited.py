"""T7 (Fig 16): level-limited DEEPDIVER scales to tens of attributes."""
from _common import job_main
from repro.experiments.mup_perf import level_limited_sweep


def main() -> None:
    job_main(
        "T7 level-limited DEEPDIVER (Fig 16)",
        lambda spark: level_limited_sweep(
            spark, n=100_000, dims=(15, 20, 25, 30, 35), rate=1e-3,
            max_level=2, time_limit=180.0,
        ),
    )


if __name__ == "__main__":
    main()
