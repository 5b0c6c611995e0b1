"""Regenerate every table in EXPERIMENTS.md in one spark-submit run."""
import t1_compas_validation
import t2_classifier_effect
import t3_airbnb_threshold
import t4_bluenile_threshold
import t5_airbnb_datasize
import t6_airbnb_dimensions
import t7_level_limited
import t8_enhance_threshold
import t9_enhance_dimensions


def main() -> None:
    for mod in (
        t1_compas_validation,
        t2_classifier_effect,
        t3_airbnb_threshold,
        t4_bluenile_threshold,
        t5_airbnb_datasize,
        t6_airbnb_dimensions,
        t7_level_limited,
        t8_enhance_threshold,
        t9_enhance_dimensions,
    ):
        mod.main()


if __name__ == "__main__":
    main()
