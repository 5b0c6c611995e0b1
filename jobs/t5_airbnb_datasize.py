"""T5 (Fig 14): MUP identification vs dataset size (runtime ~flat in n)."""
from _common import job_main
from repro.experiments.mup_perf import datasize_sweep


def main() -> None:
    job_main(
        "T5 MUP identification vs data size (AirBnB, Fig 14)",
        lambda spark: datasize_sweep(
            spark, sizes=(10_000, 100_000, 1_000_000), d=13, rate=1e-2,
            time_limit=180.0,
        ),
    )


if __name__ == "__main__":
    main()
