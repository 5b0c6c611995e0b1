"""T9 (Fig 18 + 19): coverage enhancement vs dimensions — runtime and
input/output sizes."""
from _common import job_main
from repro.experiments.enhance_perf import enhance_dimensions_sweep


def main() -> None:
    job_main(
        "T9 coverage enhancement vs dimensions (Figs 18-19)",
        lambda spark: enhance_dimensions_sweep(
            spark, n=100_000, dims=(5, 9, 13, 17), lams=(3, 4, 5),
            rate=1e-2, time_limit=120.0,
        ),
    )


if __name__ == "__main__":
    main()
