"""SHARON baseline [35] applied to Kleene workloads (paper §6.1).

SHARON aggregates *fixed-length* event sequences online (A-Seq style
prefix counters) and does not support Kleene closure. Following the
paper's methodology, each Kleene pattern ``E+`` is flattened into the
set of fixed-length sequence queries of Kleene length 1..l, where l
bounds the longest possible match. The per-event cost is then
Σ_{j=1..l} (prefix+j) ≈ l²/2 counter updates per original query — the
blow-up that makes SHARON 3–5 orders of magnitude slower on trend
workloads. Sharing = identical flattened patterns are computed once.

Correctness: with skip-till-any-match semantics the number of matches of
the flattened length-j pattern equals the number of trends with j Kleene
events, so the sum over j equals the trend count exactly (tested against
brute force / GRETA).
"""
from __future__ import annotations

import time
from typing import Optional, Sequence

from ..core.engine import RunResult, window_instances
from ..core.events import Event
from ..core.hamlet import Metrics
from ..core.queries import Atom, Kleene, Query


def _flatten_steps(q: Query) -> tuple[list, str, list]:
    """Split ``SEQ(prefix..., E+, suffix...)`` into (prefix, E, suffix).

    SHARON supports neither negation nor nested Kleene nor edge
    predicates; the §6 workloads used with it comply.
    """
    if q.edge_pred is not None:
        raise ValueError(f"{q.qid}: SHARON flattening does not support edge predicates")
    prefix: list[str] = []
    suffix: list[str] = []
    ketype: Optional[str] = None
    for el in q.elems:
        if isinstance(el, Atom):
            (suffix if ketype is not None else prefix).append(el.etype)
        elif isinstance(el, Kleene):
            if ketype is not None:
                raise ValueError(f"{q.qid}: multiple Kleene not supported by SHARON flattening")
            ketype = el.etype
        else:
            raise ValueError(f"{q.qid}: SHARON flattening supports SEQ of atoms + one Kleene")
    if ketype is None:
        raise ValueError(f"{q.qid}: no Kleene to flatten")
    return prefix, ketype, suffix


def run_sharon(
    events: Sequence[Event], workload: Sequence[Query], *, l_max: Optional[int] = None
) -> RunResult:
    """Evaluate COUNT(*) for each query via flattened sequence workloads."""
    rr = RunResult(system="sharon")
    events = sorted(events, key=lambda e: e.time)
    rr.n_events = len(events)
    for q in workload:
        for a in q.aggs:
            if a.fn != "COUNT_STAR":
                raise ValueError("SHARON reproduction evaluates COUNT(*) workloads")

    # group queries by window signature; flattened patterns deduped within
    sigs: dict[tuple, list[Query]] = {}
    for q in workload:
        sigs.setdefault((q.window, q.slide), []).append(q)

    total_counters = 0
    for (window, slide), qs in sigs.items():
        flat = {q.qid: _flatten_steps(q) for q in qs}
        for start, evs in window_instances(events, window, slide):
            t0 = time.perf_counter()
            # bound l by the number of Kleene-type events in this window
            # (SHARON would need a compile-time estimate at least this big
            # to be complete — smaller l loses matches)
            per_pattern: dict[tuple, list] = {}
            owners: dict[tuple, list[str]] = {}
            for q in qs:
                prefix, ketype, suffix = flat[q.qid]
                # l is SHARON's compile-time estimate of the longest match;
                # passing l_max models the static global estimate (flattened
                # queries beyond the actual run length still cost counter
                # scans every event). Default: exact per-window Kleene count.
                n_k = sum(1 for e in evs if e.etype == ketype)
                l = l_max if l_max is not None else n_k
                for j in range(1, max(l, 0) + 1):
                    steps = tuple(prefix) + (ketype,) * j + tuple(suffix)
                    key = (q.qid if q.where else "", steps)  # share only same-predicate patterns
                    if key not in per_pattern:
                        per_pattern[key] = [0] * (len(steps) + 1)
                        per_pattern[key][0] = 1
                        owners[key] = []
                    owners[key].append(q.qid)
            total_counters = max(
                total_counters, sum(len(v) for v in per_pattern.values())
            )
            ops = 0
            q_by_id = {q.qid: q for q in qs}
            for e in evs:
                for (owner, steps), arr in per_pattern.items():
                    # predicate context: shared patterns ('' owner) have no
                    # predicates; owned patterns use their query's where
                    qref = q_by_id[owners[(owner, steps)][0]]
                    for j in range(len(steps), 0, -1):
                        ops += 1
                        if steps[j - 1] == e.etype and qref.matches(e):
                            arr[j] += arr[j - 1]
            counts: dict[str, int] = {q.qid: 0 for q in qs}
            for key, arr in per_pattern.items():
                for qid in set(owners[key]):
                    counts[qid] += arr[-1]
            dt = time.perf_counter() - t0
            for q in qs:
                rr.results[(q.qid, start)] = {"COUNT(*)": float(counts[q.qid])}
            rr.window_wall[start] = rr.window_wall.get(start, 0.0) + dt
            rr.total_wall += dt
            m = Metrics(events=len(evs), ops=ops)
            m.peak_mem_bytes = sum(len(v) for v in per_pattern.values()) * 8
            rr.metrics.absorb(m)
    rr.notes["peak_counters"] = total_counters
    return rr
