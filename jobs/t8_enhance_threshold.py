"""T8 (Fig 17): coverage enhancement vs threshold, GREEDY vs naive."""
from _common import job_main
from repro.experiments.enhance_perf import enhance_threshold_sweep


def main() -> None:
    job_main(
        "T8 coverage enhancement vs threshold (Fig 17)",
        lambda spark: enhance_threshold_sweep(
            spark, n=100_000, d=13, rates=(1e-5, 1e-4, 1e-3, 1e-2),
            lams=(3, 4, 5), include_naive=True, time_limit=120.0,
        ),
    )


if __name__ == "__main__":
    main()
