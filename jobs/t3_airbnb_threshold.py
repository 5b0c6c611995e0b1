"""T3 (Fig 12): MUP identification vs threshold on AirBnB-like data."""
from _common import job_main
from repro.experiments.mup_perf import threshold_sweep


def main() -> None:
    job_main(
        "T3 MUP identification vs threshold (AirBnB, Fig 12)",
        lambda spark: threshold_sweep(
            spark, dataset="airbnb", n=100_000, d=13,
            rates=(1e-5, 1e-4, 1e-3, 1e-2), time_limit=180.0,
        ),
    )


if __name__ == "__main__":
    main()
