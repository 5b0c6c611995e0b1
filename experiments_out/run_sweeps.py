"""Collect all table numbers at the DESIGN.md §5 scales; JSON per table."""
import json, os, sys, time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 24g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("sweeps")
    .config("spark.sql.shuffle.partitions", "64")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .getOrCreate()
)

from repro.experiments import compas_validation, classifier_effect
from repro.experiments.mup_perf import (
    threshold_sweep, datasize_sweep, dimensions_sweep, level_limited_sweep,
)
from repro.experiments.enhance_perf import (
    enhance_threshold_sweep, enhance_dimensions_sweep,
)

OUT = os.path.dirname(os.path.abspath(__file__))

def save(name, rows, t0):
    with open(os.path.join(OUT, name + ".json"), "w") as f:
        json.dump(rows, f, indent=1, default=str)
    print(f"[done] {name} in {time.time()-t0:.1f}s ({len(rows)} rows)", flush=True)

t0=time.time(); save("t1_compas", compas_validation.run(spark), t0)
t0=time.time(); save("t2_classifier", classifier_effect.run(), t0)
t0=time.time(); save("t4_bluenile_threshold", threshold_sweep(
    spark, dataset="bluenile", n=116_300, rates=(1e-5, 1e-4, 1e-3, 1e-2), time_limit=180.0), t0)
t0=time.time(); save("t3_airbnb_threshold", threshold_sweep(
    spark, dataset="airbnb", n=100_000, d=13, rates=(1e-5, 1e-4, 1e-3, 1e-2), time_limit=180.0), t0)
t0=time.time(); save("t6_dimensions", dimensions_sweep(
    spark, n=100_000, dims=(5, 7, 9, 11, 13), rate=1e-3, time_limit=180.0), t0)
t0=time.time(); save("t7_level_limited", level_limited_sweep(
    spark, n=100_000, dims=(15, 20, 25, 30, 35), rate=1e-3, max_level=2, time_limit=180.0), t0)
t0=time.time(); save("t5_datasize", datasize_sweep(
    spark, sizes=(10_000, 100_000, 1_000_000), d=13, rate=1e-2, time_limit=180.0), t0)
t0=time.time(); save("t8_enhance_threshold", enhance_threshold_sweep(
    spark, n=100_000, d=13, rates=(1e-5, 1e-4, 1e-3, 1e-2), lams=(3, 4, 5),
    include_naive=True, time_limit=120.0), t0)
t0=time.time(); save("t9_enhance_dimensions", enhance_dimensions_sweep(
    spark, n=100_000, dims=(5, 9, 13, 17), lams=(3, 4, 5), rate=1e-2,
    time_limit=120.0), t0)
spark.stop()
print("ALL DONE", flush=True)
