"""Workload-level execution facade: windows, systems, metrics.

``run_system(events, workload, system)`` evaluates a whole workload of
trend aggregation queries over one group's event stream under a chosen
system:

- ``hamlet``            — sharable sets + dynamic per-burst optimizer (§4)
- ``hamlet-static``     — sharable sets, compile-time always-share (§6.2)
- ``hamlet-nonshared``  — Hamlet executor, sharing disabled
- ``greta``             — the non-shared GRETA baseline (§3.2, Eq. 4 loop)
- ``sharon`` / ``mcep`` — baselines (repro.baselines)

Windows: each (window, slide) signature is evaluated per window
*instance* (DESIGN.md substitution: cross-window pane sharing is prior
work, not the contribution). Latency is the wall-clock to process a
window instance; throughput is events/second over the whole run —
matching the paper's metric definitions (§6.1).
"""
from __future__ import annotations

import time
from bisect import bisect_left, bisect_right
from dataclasses import dataclass, field
from typing import Callable, Optional, Sequence

from .events import Event
from .greta import GretaState
from .hamlet import HamletSetEngine, Metrics
from .queries import Query
from .template import SharableSet, pane_size, sharable_sets

SYSTEMS = ("hamlet", "hamlet-static", "hamlet-nonshared", "greta", "sharon", "mcep")


@dataclass
class RunResult:
    """Outcome of one system over one group's stream."""

    system: str
    results: dict = field(default_factory=dict)  # (qid, window_start) -> {agg: value}
    metrics: Metrics = field(default_factory=Metrics)
    window_wall: dict = field(default_factory=dict)  # window_start -> seconds
    total_wall: float = 0.0
    n_events: int = 0
    notes: dict = field(default_factory=dict)

    @property
    def latency(self) -> float:
        """Average per-window processing latency in seconds (§6.1)."""
        if not self.window_wall:
            return 0.0
        return sum(self.window_wall.values()) / len(self.window_wall)

    @property
    def throughput(self) -> float:
        """Events processed per second across the run."""
        return self.n_events / self.total_wall if self.total_wall > 0 else 0.0

    def merge(self, other: "RunResult") -> None:
        """Combine results from another group's run (Spark partitions)."""
        self.results.update(other.results)
        self.metrics.absorb(other.metrics)
        for w, s in other.window_wall.items():
            self.window_wall[w] = self.window_wall.get(w, 0.0) + s
        self.total_wall += other.total_wall
        self.n_events += other.n_events


def window_instances(events: Sequence[Event], window: float, slide: float):
    """Yield ``(window_start, events_in_window)`` for every non-empty
    instance of a sliding window over a time-sorted event list."""
    if not events:
        return
    times = [e.time for e in events]
    t_max = times[-1]
    m = 0
    while m * slide <= t_max:
        start = m * slide
        lo = bisect_left(times, start)
        hi = bisect_right(times, start + window - 1e-12)
        if hi > lo:
            yield start, events[lo:hi]
        m += 1


def _engine_groups(workload: Sequence[Query]):
    """Partition the workload into sharable sets and singleton queries
    (workload analysis, §3.1)."""
    sets, singles = sharable_sets(workload)
    groups: list[tuple] = []
    for s in sets:
        groups.append((s.queries, s.etype, s.pane))
    for q in singles:
        kts = sorted(q.kleene_types())
        groups.append(((q,), kts[0] if kts else None, pane_size([q.window, q.slide])))
    return groups


def run_system(
    events: Sequence[Event],
    workload: Sequence[Query],
    system: str = "hamlet",
    *,
    sharon_l: Optional[int] = None,
    mcep_max_trends: int = 200_000,
) -> RunResult:
    """Evaluate ``workload`` over one group's time-sorted ``events``."""
    events = sorted(events, key=lambda e: e.time)
    if system in ("sharon", "mcep"):
        from ..baselines import mcep as _mcep
        from ..baselines import sharon as _sharon

        if system == "sharon":
            return _sharon.run_sharon(events, workload, l_max=sharon_l)
        return _mcep.run_mcep(events, workload, max_trends=mcep_max_trends)

    rr = RunResult(system=system)
    rr.n_events = len(events)
    if system == "greta":
        # window-major so peak memory reflects the k concurrently-live
        # per-query graphs (each query replicates its matched events, §3.2)
        sigs: dict[tuple, list[Query]] = {}
        for q in workload:
            sigs.setdefault((q.window, q.slide), []).append(q)
        for (window, slide), qs in sigs.items():
            for start, evs in window_instances(events, window, slide):
                win_mem = 0
                for q in qs:
                    t0 = time.perf_counter()
                    st = GretaState(q)
                    for e in evs:
                        st.on_event(e)
                    res = st.results()
                    dt = time.perf_counter() - t0
                    rr.results[(q.qid, start)] = res
                    rr.window_wall[start] = rr.window_wall.get(start, 0.0) + dt
                    rr.total_wall += dt
                    win_mem += st.n_stored * 32
                    rr.metrics.absorb(
                        Metrics(events=len(evs), stored_events=st.n_stored, ops=st.ops)
                    )
                rr.metrics.peak_mem_bytes = max(rr.metrics.peak_mem_bytes, win_mem)
        return rr

    mode = {
        "hamlet": "dynamic",
        "hamlet-static": "static",
        "hamlet-nonshared": "nonshared",
    }[system]
    for queries, ketype, pane in _engine_groups(workload):
        q0 = queries[0]
        for start, evs in window_instances(events, q0.window, q0.slide):
            t0 = time.perf_counter()
            if ketype is None:
                # pure event-sequence query: GRETA state is the executor
                st = GretaState(q0)
                for e in evs:
                    st.on_event(e)
                res = {q0.qid: st.results()}
                eng_metrics = Metrics(events=len(evs), stored_events=st.n_stored, ops=st.ops)
            else:
                eng = HamletSetEngine(
                    queries,
                    ketype,
                    mode=mode if len(queries) > 1 else "nonshared",
                    pane=pane,
                )
                for e in evs:
                    eng.on_event(e)
                eng.end_window()
                res = eng.results()
                eng_metrics = eng.m
            dt = time.perf_counter() - t0
            for qid, aggs in res.items():
                rr.results[(qid, start)] = aggs
            rr.window_wall[start] = rr.window_wall.get(start, 0.0) + dt
            rr.total_wall += dt
            rr.metrics.absorb(eng_metrics)
    return rr
