"""Dynamic sharing optimizer (paper §4).

Implements the two benefit models — Definition 11 (the simple form used
in the worked examples Eq. 9–11) and Definition 12 / Eq. 8 (the refined
form with ``log2(g)`` insertion cost and predecessor-type factor ``p``)
— plus the per-burst sharing decision with the pruning principles of
Theorems 4.1 and 4.2: queries that introduce no snapshots always share;
each snapshot-introducing query is included iff its marginal snapshot
cost is below its re-computation cost, so only the m+1 Level-1/2 plans
of the Fig. 7 lattice are ever evaluated.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Mapping, Sequence


@dataclass(frozen=True)
class CostModel:
    """Paper cost formulas. All arguments follow Table 2 notation."""

    # Definition 12 / Eq. 8 ------------------------------------------------
    def shared_cost(self, *, b: float, n: float, g: float, s_c: float, s_p: float, k: float, p: float) -> float:
        return s_c * k * g * p + b * (math.log2(max(g, 1.0) + 1e-12) + n * max(s_p, 1.0))

    def nonshared_cost(self, *, b: float, n: float, g: float, k: float) -> float:
        return k * b * (math.log2(max(g, 1.0) + 1e-12) + n)

    def benefit(self, *, b: float, n: float, g: float, s_c: float, s_p: float, k: float, p: float) -> float:
        return self.nonshared_cost(b=b, n=n, g=g, k=k) - self.shared_cost(
            b=b, n=n, g=g, s_c=s_c, s_p=s_p, k=k, p=p
        )

    # Definition 11 (simple model, used by the paper's Eq. 9–11 examples) --
    def shared_cost_simple(self, *, b: float, n: float, g: float, s_c: float, s_p: float, k: float, t: float) -> float:
        return b * n * s_p + s_c * k * g * t

    def nonshared_cost_simple(self, *, b: float, n: float, k: float) -> float:
        return k * b * n

    def benefit_simple(self, *, b: float, n: float, g: float, s_c: float, s_p: float, k: float, t: float) -> float:
        return self.nonshared_cost_simple(b=b, n=n, k=k) - self.shared_cost_simple(
            b=b, n=n, g=g, s_c=s_c, s_p=s_p, k=k, t=t
        )


@dataclass
class BurstStats:
    """Statistics of one complete burst, gathered by the executor before
    deciding (Definition 10/11): per-query match bit-vectors over the
    burst plus which queries carry Kleene edge predicates (those diverge
    on every event — Definition 9)."""

    b: int
    match_vectors: Mapping[str, tuple]  # qid -> tuple[bool, ...] length b
    edge_pred_qids: frozenset


@dataclass
class SharingPlan:
    """Outcome of one per-burst decision."""

    shared: frozenset  # qids sharing the burst's graphlet ('' empty = split)
    s_c_est: int = 0
    m_snapshot_queries: int = 0
    plans_considered: int = 1


def _divergent_events(stats: BurstStats, qids: Sequence[str], reference: tuple) -> dict[str, int]:
    """Per query: number of burst events where its match vector differs from
    the reference vector (each such event forces an event-level snapshot)."""
    out = {}
    for qid in qids:
        mv = stats.match_vectors[qid]
        if qid in stats.edge_pred_qids:
            out[qid] = stats.b  # edge predicates diverge on every event
        else:
            out[qid] = sum(1 for a, r in zip(mv, reference) if a != r)
    return out


def choose_plan(
    stats: BurstStats,
    *,
    mode: str,
    n_so_far: int,
    g_active: int,
    s_p_live: int,
    p_avg: float,
    cost: CostModel = CostModel(),
) -> SharingPlan:
    """Per-burst sharing decision (§4.2 + §4.3).

    ``mode``: 'dynamic' (Hamlet), 'static' (always share everything —
    the compile-time strawman of Figs. 12–13), 'nonshared' (GRETA path).
    """
    qids = sorted(stats.match_vectors)
    k_all = len(qids)
    if mode == "static":
        return SharingPlan(shared=frozenset(qids) if k_all > 1 else frozenset())
    if mode == "nonshared" or k_all < 2 or stats.b == 0:
        return SharingPlan(shared=frozenset())
    assert mode == "dynamic", mode

    # Reference match vector: the majority vector among snapshot-free
    # candidates; queries matching it introduce no snapshots (Thm 4.1 —
    # always beneficial to share them).
    from collections import Counter

    vec_counts = Counter(
        stats.match_vectors[qid] for qid in qids if qid not in stats.edge_pred_qids
    )
    if not vec_counts:
        reference = (True,) * stats.b
    else:
        reference = vec_counts.most_common(1)[0][0]
    div = _divergent_events(stats, qids, reference)
    core = [qid for qid in qids if div[qid] == 0]
    others = [qid for qid in qids if div[qid] > 0]

    b, g = stats.b, max(g_active + stats.b, 1)
    n = max(n_so_far, 1)
    # Thm 4.2 marginal test per snapshot-introducing query (Eq. 14): share q
    # iff the snapshots it introduces cost less than recomputing it.
    shared = list(core)
    plans = 1
    for qid in others:
        plans += 1
        snap_cost = div[qid] * g * max(p_avg, 1.0)
        recompute_cost = b * (math.log2(max(g, 1.0)) + n)
        if snap_cost <= recompute_cost:
            shared.append(qid)
    if len(shared) < 2:
        return SharingPlan(
            shared=frozenset(), m_snapshot_queries=len(others), plans_considered=plans
        )
    # Overall share-vs-split decision for the chosen set (Eq. 8).
    s_c = max((div[qid] for qid in shared), default=0)
    ben = cost.benefit(
        b=b, n=n, g=g, s_c=s_c, s_p=max(s_p_live, 1), k=len(shared), p=max(p_avg, 1.0)
    )
    if ben <= 0:
        return SharingPlan(
            shared=frozenset(), s_c_est=s_c, m_snapshot_queries=len(others), plans_considered=plans
        )
    return SharingPlan(
        shared=frozenset(shared), s_c_est=s_c, m_snapshot_queries=len(others), plans_considered=plans
    )
