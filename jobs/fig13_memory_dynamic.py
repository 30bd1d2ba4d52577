#!/usr/bin/env python
"""T13 (paper Fig. 13): peak memory + snapshot counts, dynamic vs static
sharing (same runs as T12; memory/snapshot projection)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import parse_scale

from repro.bench.experiments import fig12_fig13
from repro.bench.harness import to_markdown

if __name__ == "__main__":
    rows = fig12_fig13(parse_scale(__doc__))
    print(
        to_markdown(
            rows,
            ["table", "panel", "x_name", "x", "system", "mem_kb", "snapshots", "shared_burst_pct"],
        )
    )
