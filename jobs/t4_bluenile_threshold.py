"""T4 (Fig 13): MUP identification vs threshold on BlueNile-like data."""
from _common import job_main
from repro.experiments.mup_perf import threshold_sweep


def main() -> None:
    job_main(
        "T4 MUP identification vs threshold (BlueNile, Fig 13)",
        lambda spark: threshold_sweep(
            spark, dataset="bluenile", n=116_300,
            rates=(1e-5, 1e-4, 1e-3, 1e-2), time_limit=180.0,
        ),
    )


if __name__ == "__main__":
    main()
