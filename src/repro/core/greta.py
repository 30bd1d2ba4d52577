"""Non-shared online trend aggregation — the GRETA baseline (paper §3.2).

One :class:`GretaState` evaluates one query over one (group, window
instance): every matched event is inserted into the query graph, its
intermediate trend count (Eq. 2) is computed by iterating over its
predecessor events, and final aggregates accumulate over end-type events
(Eq. 3). The per-event predecessor iteration is deliberate — it is the
O(n) inner loop that makes non-shared execution ``k × n²`` (Eq. 4) and
is exactly the cost Hamlet's shared graphlets avoid.

Besides COUNT(*), linear channels propagate COUNT(E)/SUM/AVG through the
same recurrence; MIN/MAX use a finalize-time reachability pass (an event
contributes iff it participates in at least one complete trend).
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Optional, Sequence

from .events import Event
from .queries import AggSpec, Query
from .template import Template, build_template


@dataclass(frozen=True)
class Channel:
    """One linear aggregate channel over events of ``etype`` (attr=None for
    COUNT(E); otherwise SUM of ``attr``)."""

    etype: str
    attr: Optional[str]


def channels_for(q: Query) -> tuple[Channel, ...]:
    chans: list[Channel] = []
    for a in q.aggs:
        if a.fn == "COUNT_E":
            c = Channel(a.etype, None)
        elif a.fn in ("SUM", "AVG"):
            c = Channel(a.etype, a.attr)
            if a.fn == "AVG":  # AVG needs COUNT(E) too
                c2 = Channel(a.etype, None)
                if c2 not in chans:
                    chans.append(c2)
        else:
            continue
        if c not in chans:
            chans.append(c)
    return tuple(chans)


class _Rec:
    """Graph node: one matched event with its intermediate aggregates."""

    __slots__ = ("event", "cnt", "chan")

    def __init__(self, event: Event, cnt: int, chan: list):
        self.event = event
        self.cnt = cnt
        self.chan = chan  # per-channel intermediate values


class GretaState:
    """Online non-shared trend aggregation for one query on one window."""

    def __init__(self, q: Query, tpl: Optional[Template] = None):
        self.q = q
        self.tpl = tpl or build_template(q)
        self.channels = channels_for(q)
        self.recs: dict[str, list[_Rec]] = {t: [] for t in self.tpl.types}
        self.blocker_times: dict[str, list[float]] = {n: [] for n in self.tpl.neg_types}
        # final accumulators (Eq. 3); trailing negation keeps a pending slice
        # that a later matched negative event voids.
        self.r_cnt = 0
        self.r_chan = [0.0] * len(self.channels)
        self._pend_cnt = 0
        self._pend_chan = [0.0] * len(self.channels)
        self.ops = 0  # predecessor accesses — the model's n factor
        self.n_stored = 0

    # -- helpers ------------------------------------------------------------
    def _edge_ok(self, prev: _Rec, e: Event) -> Optional[tuple]:
        """Is prev.event a valid predecessor of ``e``? Returns the matching
        pt-edge or None. Checks negation blockers and the Kleene edge
        predicate (in-Kleene adjacency only)."""
        pe = prev.event
        for edge in self.tpl.pt[e.etype]:
            if edge.ptype != pe.etype:
                continue
            if edge.blocker is not None and any(
                pe.time < t < e.time for t in self.blocker_times.get(edge.blocker, ())
            ):
                continue
            if (
                self.q.edge_pred is not None
                and e.etype in self.tpl.kleene
                and pe.etype == e.etype
                and not self.q.edge_pred.ok(pe, e)
            ):
                continue
            return edge
        return None

    # -- online processing --------------------------------------------------
    def on_event(self, e: Event) -> None:
        tpl = self.tpl
        if e.etype in tpl.neg_types:
            if self.q.matches(e):
                self.blocker_times[e.etype].append(e.time)
                if tpl.trailing_neg == e.etype:
                    # trends ending before this negative match are voided
                    self._pend_cnt = 0
                    self._pend_chan = [0.0] * len(self.channels)
            return
        if e.etype not in tpl.types or not self.q.matches(e):
            return
        start = 1 if e.etype in tpl.start else 0
        pe_cnt = 0
        pe_chan = [0.0] * len(self.channels)
        ptypes = {edge.ptype for edge in tpl.pt.get(e.etype, ())}
        for ptype in ptypes:
            for rec in self.recs.get(ptype, ()):  # THE O(n) loop (Eq. 4)
                self.ops += 1
                if self._edge_ok(rec, e) is not None:
                    pe_cnt += rec.cnt
                    for i in range(len(self.channels)):
                        pe_chan[i] += rec.chan[i]
        cnt = start + pe_cnt
        chan = pe_chan
        for i, c in enumerate(self.channels):
            if e.etype == c.etype:
                chan[i] += cnt * (1 if c.attr is None else e.attrs.get(c.attr, 0.0))
        rec = _Rec(e, cnt, chan)
        self.recs[e.etype].append(rec)
        self.n_stored += 1
        if e.etype in tpl.end:
            if tpl.trailing_neg is not None:
                self._pend_cnt += cnt
                for i in range(len(self.channels)):
                    self._pend_chan[i] += chan[i]
            else:
                self.r_cnt += cnt
                for i in range(len(self.channels)):
                    self.r_chan[i] += chan[i]

    # -- finalize -----------------------------------------------------------
    def _participants(self) -> list[_Rec]:
        """Events participating in >=1 complete trend (for MIN/MAX).

        Reverse pass: an event participates iff cnt>0 and it reaches a
        valid end event through the match DAG.
        """
        all_recs = sorted(
            (r for recs in self.recs.values() for r in recs), key=lambda r: r.event.time
        )
        reach: dict[int, bool] = {}

        def end_ok(r: _Rec) -> bool:
            if r.event.etype not in self.tpl.end:
                return False
            if self.tpl.trailing_neg is not None and any(
                t > r.event.time
                for t in self.blocker_times.get(self.tpl.trailing_neg, ())
            ):
                return False
            return True

        for i in range(len(all_recs) - 1, -1, -1):
            r = all_recs[i]
            ok = end_ok(r)
            if not ok:
                for j in range(i + 1, len(all_recs)):
                    r2 = all_recs[j]
                    if (
                        reach[id(r2)]
                        and r2.event.time > r.event.time
                        and r.event.etype in {ed.ptype for ed in self.tpl.pt.get(r2.event.etype, ())}
                        and self._edge_ok(r, r2.event) is not None
                    ):
                        ok = True
                        break
            reach[id(r)] = ok
        return [r for r in all_recs if r.cnt > 0 and reach[id(r)]]

    def results(self) -> dict[str, float]:
        """Final aggregates for this window instance (Eq. 3 + channels)."""
        r_cnt = self.r_cnt + self._pend_cnt
        r_chan = [a + b for a, b in zip(self.r_chan, self._pend_chan)]
        chan_val = {c: r_chan[i] for i, c in enumerate(self.channels)}
        out: dict[str, float] = {}
        parts: Optional[list[_Rec]] = None
        for a in self.q.aggs:
            if a.fn == "COUNT_STAR":
                out[a.name] = float(r_cnt)
            elif a.fn == "COUNT_E":
                out[a.name] = float(chan_val[Channel(a.etype, None)])
            elif a.fn == "SUM":
                out[a.name] = float(chan_val[Channel(a.etype, a.attr)])
            elif a.fn == "AVG":
                n_e = chan_val[Channel(a.etype, None)]
                s = chan_val[Channel(a.etype, a.attr)]
                out[a.name] = float(s / n_e) if n_e else math.nan
            elif a.fn in ("MIN", "MAX"):
                if parts is None:
                    parts = self._participants()
                vals = [
                    r.event.attrs.get(a.attr, 0.0)
                    for r in parts
                    if r.event.etype == a.etype
                ]
                fn = min if a.fn == "MIN" else max
                out[a.name] = float(fn(vals)) if vals else math.nan
        return out

    def exact_count(self) -> int:
        """COUNT(*) as an exact integer (may exceed float precision)."""
        return self.r_cnt + self._pend_cnt


def run_greta(events: Sequence[Event], q: Query) -> dict[str, float]:
    """Convenience: evaluate ``q`` over one window instance of events."""
    st = GretaState(q)
    for e in sorted(events, key=lambda x: x.time):
        st.on_event(e)
    return st.results()
