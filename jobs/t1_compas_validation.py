"""T1 (§V-B.1): COMPAS coverage audit — spark-submit entrypoint."""
from _common import job_main
from repro.experiments import compas_validation


def main() -> None:
    job_main("T1 COMPAS coverage audit (tau=10)", lambda spark: compas_validation.run(spark))


if __name__ == "__main__":
    main()
