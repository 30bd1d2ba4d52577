#!/usr/bin/env python
"""T10 (paper Fig. 10): peak memory of the four systems (same runs as
T9 — this entry point projects the memory columns)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import parse_scale

from repro.bench.experiments import fig9_fig10
from repro.bench.harness import to_markdown

if __name__ == "__main__":
    rows = fig9_fig10(parse_scale(__doc__))
    print(to_markdown(rows, ["table", "panel", "x_name", "x", "system", "mem_kb", "modelled"]))
