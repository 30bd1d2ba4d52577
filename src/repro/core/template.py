"""Query templates and workload analysis (paper §3.1, §5).

A *query template* is the FSA-flavoured summary of one pattern: which
event types appear, which types start/end trends, and the predecessor
type relation ``pt(E, q)`` with optional negation blockers on
transitions. The *merged template* overlays all queries in the workload
and labels each transition with the queries it belongs to (Fig. 3(b) /
Fig. 8). Workload analysis finds sharable Kleene sub-patterns
(Definition 4), groups sharable queries (Definition 5), and computes the
pane size (gcd of windows and slides).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from fractions import Fraction
from math import gcd as _int_gcd
from typing import Iterable, Mapping, Optional, Sequence

from .queries import Atom, GroupKleene, Kleene, Neg, Query


@dataclass(frozen=True)
class PtEdge:
    """One predecessor-type edge: events of ``ptype`` precede events of the
    owning type; ``blocker`` (if set) is a negated type that severs
    connections across its matched occurrences (§5, Pattern with Negation)."""

    ptype: str
    blocker: Optional[str] = None


@dataclass
class Template:
    """Per-query template: Example 2's ``start``/``end``/``pt`` relations."""

    types: frozenset
    start: frozenset
    end: frozenset
    pt: Mapping[str, tuple]  # etype -> tuple[PtEdge, ...]
    kleene: frozenset  # single-type Kleene-plus types (Definition 4)
    neg_types: frozenset
    trailing_neg: Optional[str] = None  # SEQ(..., NOT N) — invalidates earlier ends


def build_template(q: Query) -> Template:
    """Construct the template of ``q`` by one walk over its pattern.

    Mirrors the state-machine construction of [33] (GRETA): each positive
    element contributes states/transitions; ``Neg`` marks the next
    transition as blocked by the negated type; ``GroupKleene`` adds the
    §5 back-loop from its inner end types to its inner start types.

    The result is memoized on the Query instance (templates are pure
    functions of the pattern; engines are built once per window
    instance, so this keeps setup cost out of the latency metric).
    """
    cached = q.__dict__.get("_tpl_cache")
    if cached is not None:
        return cached
    pt: dict[str, set[PtEdge]] = {}
    types: set[str] = set()
    neg_types: set[str] = set()
    kleene: set[str] = set()
    start: set[str] = set()
    trailing_neg: Optional[str] = None

    def add_edge(etype: str, ptype: str, blocker: Optional[str]) -> None:
        pt.setdefault(etype, set()).add(PtEdge(ptype, blocker))

    def walk(elems: Sequence, prev_ends: set[str], blocker: Optional[str], first: bool):
        """Returns (prev_ends, blocker, first) after consuming ``elems``."""
        nonlocal trailing_neg
        for el in elems:
            if isinstance(el, Neg):
                types.add(el.etype)
                neg_types.add(el.etype)
                blocker = el.etype
                trailing_neg = el.etype  # provisional; cleared by a later positive elem
                continue
            trailing_neg = None
            if isinstance(el, Atom) or isinstance(el, Kleene):
                e = el.etype
                types.add(e)
                for p in prev_ends:
                    add_edge(e, p, blocker)
                if isinstance(el, Kleene):
                    kleene.add(e)
                    add_edge(e, e, None)
                if first:
                    start.add(e)
                    first = False
                prev_ends = {e}
                blocker = None
            elif isinstance(el, GroupKleene):
                inner_first_types = _first_positive_types(el.elems)
                if first:
                    start.update(inner_first_types)
                    first = False
                for p in prev_ends:
                    for s in inner_first_types:
                        add_edge(s, p, blocker)
                blocker = None
                inner_ends, _, _ = walk(el.elems, set(), None, True)
                # the + back-loop: inner end types precede inner start types
                for endt in inner_ends:
                    for s in inner_first_types:
                        add_edge(s, endt, None)
                prev_ends = inner_ends
            else:  # pragma: no cover - guarded by type checks upstream
                raise TypeError(f"unknown pattern element {el!r}")
        return prev_ends, blocker, first

    prev_ends, _, first = walk(q.elems, set(), None, True)
    if first:
        raise ValueError(f"pattern of {q.qid} has no positive element")
    tpl = Template(
        types=frozenset(types),
        start=frozenset(start),
        end=frozenset(prev_ends),
        pt={e: tuple(sorted(v, key=lambda x: (x.ptype, x.blocker or ""))) for e, v in pt.items()},
        kleene=frozenset(kleene),
        neg_types=frozenset(neg_types),
        trailing_neg=trailing_neg,
    )
    q.__dict__["_tpl_cache"] = tpl
    return tpl


def _first_positive_types(elems: Sequence) -> set[str]:
    for el in elems:
        if isinstance(el, (Atom, Kleene)):
            return {el.etype}
        if isinstance(el, GroupKleene):
            return _first_positive_types(el.elems)
    raise ValueError("pattern group has no positive element")


# ---------------------------------------------------------------------------
# Merged workload template (Fig. 3(b), Fig. 8)
# ---------------------------------------------------------------------------


@dataclass
class MergedTemplate:
    """Workload-wide template: transition -> set of qids it holds for."""

    transitions: Mapping[tuple, frozenset]  # (ptype, etype) -> qids
    type_queries: Mapping[str, frozenset]  # etype -> qids whose pattern uses it
    templates: Mapping[str, Template]  # qid -> per-query template

    def queries_on(self, ptype: str, etype: str) -> frozenset:
        return self.transitions.get((ptype, etype), frozenset())


def merge_templates(workload: Sequence[Query]) -> MergedTemplate:
    transitions: dict[tuple, set[str]] = {}
    type_queries: dict[str, set[str]] = {}
    templates: dict[str, Template] = {}
    for q in workload:
        tpl = build_template(q)
        templates[q.qid] = tpl
        for t in tpl.types:
            type_queries.setdefault(t, set()).add(q.qid)
        for etype, edges in tpl.pt.items():
            for edge in edges:
                transitions.setdefault((edge.ptype, etype), set()).add(q.qid)
    return MergedTemplate(
        transitions={k: frozenset(v) for k, v in transitions.items()},
        type_queries={k: frozenset(v) for k, v in type_queries.items()},
        templates=templates,
    )


# ---------------------------------------------------------------------------
# Sharable queries (Definitions 4 & 5) and pane size
# ---------------------------------------------------------------------------


def agg_signature(q: Query) -> tuple:
    """Aggregate-compatibility class (Definition 5 discussion).

    COUNT(*), MIN and MAX only share with queries computing the same
    aggregate; SUM / AVG / COUNT(E) are inter-shareable per event type
    because AVG = SUM / COUNT(E).
    """
    strict: set[tuple] = set()
    linear: set[str] = set()
    for a in q.aggs:
        if a.fn == "COUNT_STAR":
            strict.add(("cnt",))
        elif a.fn in ("MIN", "MAX"):
            strict.add((a.fn, a.etype, a.attr))
        else:  # SUM / AVG / COUNT_E
            linear.add(a.etype)
    return (frozenset(strict), frozenset(linear))


@dataclass
class SharableSet:
    """A set of queries sharing one Kleene sub-pattern ``etype+``.

    ``pane`` is the gcd of the member windows/slides (here equal by
    construction, see DESIGN.md substitutions)."""

    etype: str
    queries: tuple
    pane: float

    @property
    def qids(self) -> tuple:
        return tuple(q.qid for q in self.queries)


def pane_size(windows_and_slides: Iterable[float]) -> float:
    """gcd of window sizes and slides, computed over exact rationals so
    e.g. gcd(10 min, 15 min, 5 min) = 5 min without float drift."""
    fracs = [Fraction(x).limit_denominator(10**6) for x in windows_and_slides]
    if not fracs:
        raise ValueError("need at least one window")
    # gcd(a/b, c/d) = gcd(a*d, c*b) / (b*d), reduced by Fraction
    g = fracs[0]
    for f in fracs[1:]:
        g = Fraction(_int_gcd(g.numerator * f.denominator, f.numerator * g.denominator), g.denominator * f.denominator)
    return float(g)


def sharable_sets(workload: Sequence[Query]) -> tuple[list[SharableSet], list[Query]]:
    """Split the workload into sharable sets (>=2 queries per Definition 5)
    and leftover singleton queries.

    A query joins at most one set, keyed by its (first) Kleene type plus
    window, slide, group-by and aggregate signature.
    """
    buckets: dict[tuple, list[Query]] = {}
    no_kleene: list[Query] = []
    for q in workload:
        kts = sorted(q.kleene_types())
        if not kts:
            no_kleene.append(q)
            continue
        key = (kts[0], q.window, q.slide, q.groupby, agg_signature(q))
        buckets.setdefault(key, []).append(q)
    sets: list[SharableSet] = []
    singles: list[Query] = list(no_kleene)
    for (etype, window, slide, _gb, _sig), qs in sorted(
        buckets.items(), key=lambda kv: (kv[0][0], kv[0][1], kv[0][2])
    ):
        if len(qs) > 1:
            sets.append(SharableSet(etype=etype, queries=tuple(qs), pane=pane_size([window, slide])))
        else:
            singles.extend(qs)
    return sets, singles
