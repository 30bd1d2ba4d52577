"""MCEP baseline [22]: shared two-step trend aggregation (paper §6.1).

MCEP *shares the construction of event trends* across queries, then
aggregates them as a post-processing step. The shared construction is
a DFS over the match graph that carries, per path, the set of queries
the path is valid for (shared prefix validation — the optimization the
paper credits MCEP with); every constructed trend is then counted for
each query it matches. The cost is proportional to the number of
trends — exponential in the events per window (§1: "even if trend
construction is shared, its exponential complexity is not avoided").

Because full enumeration is physically impossible above tiny windows,
the runner enumerates up to ``max_trends`` trends; beyond that the
latency is *modelled* as (measured seconds/trend × the largest exact
per-query trend count from the GRETA DP — a lower bound on the shared
enumeration size) and flagged in ``notes['modelled']``. Aggregates are
then computed exactly by the per-query DP, so correctness tests hold at
any scale. See DESIGN.md substitutions.
"""
from __future__ import annotations

import time
from typing import Sequence

from ..core.engine import RunResult, window_instances
from ..core.events import Event
from ..core.greta import GretaState
from ..core.hamlet import Metrics
from ..core.queries import Query
from ..core.template import build_template


class _QueryCtx:
    """Per-query match/edge validation over one window instance."""

    def __init__(self, q: Query, events: Sequence[Event]):
        self.q = q
        self.tpl = build_template(q)
        self.blockers = {
            n: [e.time for e in events if e.etype == n and q.matches(e)]
            for n in self.tpl.neg_types
        }

    def node_ok(self, e: Event) -> bool:
        return (
            e.etype in self.tpl.types
            and e.etype not in self.tpl.neg_types
            and self.q.matches(e)
        )

    def start_ok(self, e: Event) -> bool:
        return self.node_ok(e) and e.etype in self.tpl.start

    def edge_ok(self, prev: Event, cur: Event) -> bool:
        if not self.node_ok(cur):
            return False
        for edge in self.tpl.pt.get(cur.etype, ()):
            if edge.ptype != prev.etype:
                continue
            if edge.blocker is not None and any(
                prev.time < t < cur.time for t in self.blockers.get(edge.blocker, ())
            ):
                continue
            if (
                self.q.edge_pred is not None
                and cur.etype in self.tpl.kleene
                and prev.etype == cur.etype
                and not self.q.edge_pred.ok(prev, cur)
            ):
                continue
            return True
        return False

    def end_ok(self, e: Event) -> bool:
        if e.etype not in self.tpl.end:
            return False
        if self.tpl.trailing_neg is not None and any(
            t > e.time for t in self.blockers.get(self.tpl.trailing_neg, ())
        ):
            return False
        return True


def run_mcep(
    events: Sequence[Event], workload: Sequence[Query], *, max_trends: int = 200_000
) -> RunResult:
    rr = RunResult(system="mcep")
    events = sorted(events, key=lambda e: e.time)
    rr.n_events = len(events)
    for q in workload:
        for a in q.aggs:
            if a.fn != "COUNT_STAR":
                raise ValueError("MCEP reproduction evaluates COUNT(*) workloads")
    modelled_any = False
    sigs: dict[tuple, list[Query]] = {}
    for q in workload:
        sigs.setdefault((q.window, q.slide), []).append(q)
    for (window, slide), qs in sigs.items():
        for start, evs in window_instances(events, window, slide):
            t0 = time.perf_counter()
            ctxs = [_QueryCtx(q, evs) for q in qs]
            nodes = [e for e in evs if any(c.node_ok(e) for c in ctxs)]
            counts = {q.qid: 0 for q in qs}
            enumerated = 0
            budget_hit = False

            def dfs(path: list, mask: list) -> None:
                """Shared construction: mask[i] = path valid so far for
                query i. A path is a trend for query i when mask[i] and
                its last event is an end for i."""
                nonlocal enumerated, budget_hit
                if budget_hit:
                    return
                cur = path[-1]
                ended = False
                for i, c in enumerate(ctxs):
                    if mask[i] and c.end_ok(cur):
                        counts[c.q.qid] += 1  # aggregation step
                        ended = True
                if ended:
                    enumerated += 1
                    if enumerated >= max_trends:
                        budget_hit = True
                        return
                for nxt in nodes:
                    if nxt.time <= cur.time:
                        continue
                    nmask = [m and c.edge_ok(cur, nxt) for m, c in zip(mask, ctxs)]
                    if any(nmask):
                        path.append(nxt)
                        dfs(path, nmask)
                        path.pop()
                        if budget_hit:
                            return

            for s in nodes:
                smask = [c.start_ok(s) for c in ctxs]
                if any(smask):
                    dfs([s], smask)
                if budget_hit:
                    break
            dt = time.perf_counter() - t0
            if budget_hit:
                # model full-enumeration latency from the measured per-trend
                # cost and the exact trend counts (per-query DP); the max
                # per-query count lower-bounds the shared enumeration size.
                per_trend = dt / max(enumerated, 1)
                exact = {}
                for q in qs:
                    st = GretaState(q)
                    for e in evs:
                        st.on_event(e)
                    exact[q.qid] = st.exact_count()
                dt = per_trend * float(max(exact.values(), default=0))
                counts = exact
                modelled_any = True
            for q in qs:
                rr.results[(q.qid, start)] = {"COUNT(*)": float(counts[q.qid])}
            rr.window_wall[start] = rr.window_wall.get(start, 0.0) + dt
            rr.total_wall += dt
            m = Metrics(events=len(evs), stored_events=len(nodes), ops=enumerated)
            m.peak_mem_bytes = len(nodes) * 32 + 64  # shared graph + trend buffer
            rr.metrics.absorb(m)
            rr.notes["trends"] = rr.notes.get("trends", 0) + enumerated
    rr.notes["modelled"] = modelled_any
    return rr
