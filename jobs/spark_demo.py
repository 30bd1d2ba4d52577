#!/usr/bin/env python
"""spark-submit entry point: run the Hamlet workload over the Spark batch
runtime (grouped-map operator) and print the aggregate table.

Usage: spark-submit jobs/spark_demo.py  (or plain python)
"""
from pyspark.sql import SparkSession

from repro.core.workloads import workload1
from repro.sparkrt.batch import run_workload_spark
from repro.streams import ridesharing_stream, to_spark


def main() -> None:
    spark = (
        SparkSession.builder.appName("hamlet-demo")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    pdf = ridesharing_stream(minutes=2.0, events_per_min=300, n_groups=8, seed=1)
    wl = workload1(8, kleene_type="T", window=60.0, slide=60.0)
    out = run_workload_spark(spark, to_spark(spark, pdf), wl, system="hamlet")
    out.orderBy("gkey", "window_start", "qid").show(40, truncate=False)
    spark.stop()


if __name__ == "__main__":
    main()
