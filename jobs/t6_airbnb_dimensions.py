"""T6 (Fig 15): MUP identification vs number of attributes."""
from _common import job_main
from repro.experiments.mup_perf import dimensions_sweep


def main() -> None:
    job_main(
        "T6 MUP identification vs dimensions (AirBnB, Fig 15)",
        lambda spark: dimensions_sweep(
            spark, n=100_000, dims=(5, 7, 9, 11, 13), rate=1e-3,
            time_limit=180.0,
        ),
    )


if __name__ == "__main__":
    main()
