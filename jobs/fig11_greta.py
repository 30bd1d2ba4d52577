#!/usr/bin/env python
"""T11 (paper Fig. 11): Hamlet vs GRETA on the NYC-taxi-like and
smart-home-like streams — latency and throughput vs rate and #queries."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, parse_scale

from repro.bench.experiments import fig11

if __name__ == "__main__":
    emit(fig11(parse_scale(__doc__)))
