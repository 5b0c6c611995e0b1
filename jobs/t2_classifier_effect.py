"""T2 (Fig 11): effect of lack of coverage on classification.

Driver-only experiment (the classifier substrate is numpy); wrapped as a
job for uniformity.
"""
from _common import job_main
from repro.experiments import classifier_effect


def main() -> None:
    job_main("T2 classifier effect of coverage (Fig 11)", lambda spark: classifier_effect.run())


if __name__ == "__main__":
    main()
