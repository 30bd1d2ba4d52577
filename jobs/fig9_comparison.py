#!/usr/bin/env python
"""T9 (paper Fig. 9): Hamlet vs GRETA vs MCEP vs SHARON — latency and
throughput on the ridesharing stream, varying event rate and #queries.

Run: ``python jobs/fig9_comparison.py [--scale small]``
(also emits the memory columns that make up T10 / Fig. 10).
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, parse_scale

from repro.bench.experiments import fig9_fig10

if __name__ == "__main__":
    emit(fig9_fig10(parse_scale(__doc__)))
