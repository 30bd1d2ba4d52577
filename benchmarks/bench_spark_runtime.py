"""Spark runtime benchmark: the Hamlet grouped-map operator end-to-end
through Catalyst (shuffle + applyInPandas), one round."""
import pytest

from repro.core.workloads import workload1
from repro.sparkrt.batch import run_workload_spark
from repro.streams import ridesharing_stream, to_spark

from bench_util import run_once


def test_bench_spark_batch_hamlet(benchmark, spark):
    pdf = ridesharing_stream(minutes=1.0, events_per_min=300, n_groups=8, seed=3)
    wl = workload1(8, kleene_type="T", window=60.0, slide=60.0)
    sdf = to_spark(spark, pdf)

    def run():
        return run_workload_spark(spark, sdf, wl, system="hamlet").count()

    n = run_once(benchmark, run)
    assert n > 0
