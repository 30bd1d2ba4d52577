"""T9/T10 benchmark (paper Fig. 9/10): the four systems on one
representative ridesharing configuration each."""
import pytest

from repro.bench.harness import run_partitioned
from repro.core.workloads import workload1
from repro.streams import ridesharing_stream

from bench_util import run_once

CFG = dict(minutes=1.0, events_per_min=240, n_groups=8, burst_mean=3.0,
           p_kleene=0.15, burst_cap=6, seed=42)
K = 10


@pytest.fixture(scope="module")
def stream():
    return ridesharing_stream(**CFG)


@pytest.fixture(scope="module")
def wl():
    return workload1(K, kleene_type="T", window=60.0, slide=60.0)


@pytest.mark.parametrize("system", ["hamlet", "greta", "mcep", "sharon"])
def test_bench_t9_system(benchmark, stream, wl, system):
    kw = {}
    if system == "sharon":
        kw["sharon_l"] = int((stream["etype"] == "T").sum()) + 1
    rr = run_once(benchmark, run_partitioned, stream, wl, system, **kw)
    benchmark.extra_info["latency_ms"] = rr.latency * 1e3
    benchmark.extra_info["throughput_eps"] = rr.throughput
    benchmark.extra_info["mem_kb"] = rr.metrics.peak_mem_bytes / 1024.0
    assert rr.results
