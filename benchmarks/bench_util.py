"""Benchmark helpers: each table's benchmark runs its experiment once per
round (pedantic) at a reduced scale so `--benchmark-only` finishes in
minutes; the full-scale numbers live in EXPERIMENTS.md (jobs/)."""
from __future__ import annotations


def run_once(benchmark, fn, *args, **kwargs):
    """pytest-benchmark pedantic single-round wrapper (experiments are
    seconds-long; statistical rounds would multiply CI time for no
    insight — variance is dominated by the measured systems anyway)."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
