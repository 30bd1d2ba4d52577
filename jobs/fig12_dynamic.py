#!/usr/bin/env python
"""T12 (paper Fig. 12): dynamic vs static sharing decisions on the stock
stream with the diverse workload 2 — latency and throughput (also emits
the memory/snapshot columns of T13 / Fig. 13)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, parse_scale

from repro.bench.experiments import fig12_fig13

if __name__ == "__main__":
    emit(fig12_fig13(parse_scale(__doc__)))
