"""Shared CLI plumbing for the per-table jobs."""
from __future__ import annotations

import argparse
import sys

ROW_COLUMNS = [
    "table", "panel", "x_name", "x", "system",
    "latency_ms", "throughput_eps", "mem_kb", "snapshots",
    "shared_burst_pct", "modelled",
]


def parse_scale(description: str) -> str:
    p = argparse.ArgumentParser(description=description)
    p.add_argument(
        "--scale", choices=["full", "small"], default="full",
        help="full = EXPERIMENTS.md numbers (minutes); small = smoke (seconds)",
    )
    return p.parse_args().scale


def emit(rows) -> None:
    from repro.bench.harness import to_markdown

    print(to_markdown(rows, ROW_COLUMNS))
    sys.stdout.flush()
