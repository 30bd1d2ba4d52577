"""Query workload generators mirroring the paper's two §6.1 workloads.

Workload 1 ("sharing Kleene closure"): queries differ in their prefix
pattern but share the Kleene sub-pattern, window, group-by, predicates
and aggregate — maximally sharable, used for the Figs. 9–11 comparisons.

Workload 2 ("diverse"): prefixes of length 1–3, several window sizes,
mixed aggregates (COUNT/SUM/AVG/MAX), unary predicates of varying
selectivity, and Kleene edge predicates on a fraction of queries — the
divergence that creates snapshots and makes static sharing decisions
backfire (Figs. 12–13).
"""
from __future__ import annotations

import random
from typing import Sequence

from .queries import AggSpec, Atom, EdgePred, Kleene, Pred, Query, seq


def workload1(
    k: int,
    *,
    kleene_type: str = "T",
    prefixes: Sequence[str] = ("R", "P", "D", "C", "F0", "F1", "F2", "F3", "F4"),
    window: float = 60.0,
    slide: float = 60.0,
) -> list[Query]:
    """k fully-sharable COUNT(*) queries SEQ(prefix_i, T+)."""
    out = []
    for i in range(k):
        out.append(
            Query(
                qid=f"w1q{i}",
                elems=seq(Atom(prefixes[i % len(prefixes)]), Kleene(kleene_type)),
                aggs=(AggSpec("COUNT_STAR"),),
                window=window,
                slide=slide,
            )
        )
    return out


def workload2(
    k: int,
    *,
    kleene_type: str = "T",
    prefix_pool: Sequence[str] = ("O", "H", "L", "X"),
    windows: Sequence[float] = (60.0, 120.0),
    edge_pred_frac: float = 0.34,
    seed: int = 0,
) -> list[Query]:
    """k diverse queries over one Kleene type.

    Aggregates are drawn from COUNT(*)/SUM/AVG/MAX on the Kleene type;
    unary predicate selectivity varies; ~``edge_pred_frac`` of the
    queries carry a Kleene edge predicate (monotone price), which makes
    their predecessor sets query-specific inside shared graphlets
    (Definition 9) — the snapshot pressure the dynamic optimizer reacts
    to. Window sizes cycle so the workload splits into several sharable
    sets (Definition 5 also separates aggregate classes).
    """
    rng = random.Random(seed)
    out: list[Query] = []
    for i in range(k):
        plen = 1 + i % 3
        prefix = tuple(Atom(prefix_pool[(i + j) % len(prefix_pool)]) for j in range(plen))
        window = windows[i % len(windows)]
        agg_kind = i % 4
        if agg_kind == 0:
            aggs = (AggSpec("COUNT_STAR"),)
        elif agg_kind == 1:
            aggs = (AggSpec("SUM", kleene_type, "v"),)
        elif agg_kind == 2:
            aggs = (AggSpec("AVG", kleene_type, "v"),)
        else:
            aggs = (AggSpec("MAX", kleene_type, "v"),)
        where = {}
        sel = rng.choice([None, None, 100.0, 300.0])
        if sel is not None:
            where[kleene_type] = (Pred("v", "<=", sel),)
        edge = EdgePred("v", "<=") if rng.random() < edge_pred_frac else None
        if agg_kind == 3:
            edge = None  # MIN/MAX with Kleene edge predicates is unsupported
        out.append(
            Query(
                qid=f"w2q{i}",
                elems=seq(*prefix, Kleene(kleene_type)),
                aggs=aggs,
                where=where,
                edge_pred=edge,
                window=window,
                slide=window,
            )
        )
    return out
