"""Template construction, merged workload template, workload analysis
(paper §3.1, Examples 2/3/10, Definitions 4/5)."""
import pytest

from repro.core.queries import (
    AggSpec,
    Atom,
    GroupKleene,
    Kleene,
    Neg,
    Pred,
    Query,
    seq,
)
from repro.core.template import (
    PtEdge,
    agg_signature,
    build_template,
    merge_templates,
    pane_size,
    sharable_sets,
)


def _pt_types(tpl, etype):
    return {e.ptype for e in tpl.pt.get(etype, ())}


def test_example2_seq_a_bplus():
    """Paper Example 2: pt(B)={A,B}, pt(A)=∅, start={A}, end={B}."""
    q = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
    tpl = build_template(q)
    assert _pt_types(tpl, "B") == {"A", "B"}
    assert _pt_types(tpl, "A") == set()
    assert tpl.start == frozenset({"A"})
    assert tpl.end == frozenset({"B"})
    assert tpl.kleene == frozenset({"B"})


def test_suffix_pattern_end_type():
    tpl = build_template(Query(qid="q", elems=seq(Atom("A"), Kleene("B"), Atom("C"))))
    assert tpl.end == frozenset({"C"})
    assert _pt_types(tpl, "C") == {"B"}


def test_bare_kleene_is_start_and_end():
    tpl = build_template(Query(qid="q", elems=seq(Kleene("B"))))
    assert tpl.start == tpl.end == frozenset({"B"})
    assert _pt_types(tpl, "B") == {"B"}


def test_multi_atom_prefix():
    tpl = build_template(Query(qid="q", elems=seq(Atom("A"), Atom("C"), Kleene("B"))))
    assert _pt_types(tpl, "C") == {"A"}
    assert _pt_types(tpl, "B") == {"C", "B"}
    assert tpl.start == frozenset({"A"})


def test_negation_blocks_transition():
    tpl = build_template(Query(qid="q", elems=seq(Atom("A"), Neg("N"), Kleene("B"))))
    edges = tpl.pt["B"]
    assert PtEdge("A", "N") in edges and PtEdge("B", None) in edges
    assert "N" in tpl.neg_types and tpl.trailing_neg is None


def test_trailing_negation_detected():
    tpl = build_template(Query(qid="q", elems=seq(Atom("A"), Kleene("B"), Neg("N"))))
    assert tpl.trailing_neg == "N"
    assert tpl.end == frozenset({"B"})


def test_nested_kleene_example10():
    """Paper Example 10: (SEQ(A,B+))+ adds pt(A)={B} back-loop."""
    q = Query(qid="q1", elems=seq(GroupKleene(seq(Atom("A"), Kleene("B")))))
    tpl = build_template(q)
    assert _pt_types(tpl, "A") == {"B"}
    assert _pt_types(tpl, "B") == {"A", "B"}
    assert tpl.start == frozenset({"A"})
    assert tpl.end == frozenset({"B"})


def test_empty_pattern_rejected():
    with pytest.raises(ValueError):
        build_template(Query(qid="q", elems=seq(Neg("N"))))


def test_merged_template_example3():
    """Fig. 3(b): B→B transition labeled by both queries."""
    q1 = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
    q2 = Query(qid="q2", elems=seq(Atom("C"), Kleene("B")))
    mt = merge_templates([q1, q2])
    assert mt.queries_on("B", "B") == frozenset({"q1", "q2"})
    assert mt.queries_on("A", "B") == frozenset({"q1"})
    assert mt.queries_on("C", "B") == frozenset({"q2"})
    assert mt.type_queries["B"] == frozenset({"q1", "q2"})


@pytest.mark.parametrize(
    "vals,expected",
    [
        ([600.0, 300.0], 300.0),
        ([600.0, 900.0, 300.0], 300.0),
        ([60.0, 90.0], 30.0),
        ([1.5, 1.0], 0.5),
        ([10.0], 10.0),
    ],
)
def test_pane_size_gcd(vals, expected):
    assert pane_size(vals) == pytest.approx(expected)


def _q(qid, window=60.0, aggs=(AggSpec("COUNT_STAR"),), kleene="B", prefix="A"):
    return Query(qid=qid, elems=seq(Atom(prefix), Kleene(kleene)), aggs=aggs, window=window, slide=window)


def test_sharable_sets_groups_same_signature():
    qs = [_q("a"), _q("b", prefix="C"), _q("c", prefix="D")]
    sets, singles = sharable_sets(qs)
    assert len(sets) == 1 and len(singles) == 0
    assert sets[0].etype == "B" and set(sets[0].qids) == {"a", "b", "c"}


def test_sharable_sets_split_by_window():
    qs = [_q("a", window=60.0), _q("b", window=120.0), _q("c", window=60.0)]
    sets, singles = sharable_sets(qs)
    assert len(sets) == 1 and {q.qid for q in sets[0].queries} == {"a", "c"}
    assert [q.qid for q in singles] == ["b"]


def test_sharable_sets_split_by_aggregate_class():
    """Definition 5: COUNT(*) does not share with MAX; SUM/AVG/COUNT(E) do."""
    qs = [
        _q("cnt1"), _q("cnt2"),
        _q("sum1", aggs=(AggSpec("SUM", "B", "v"),)),
        _q("avg1", aggs=(AggSpec("AVG", "B", "v"),)),
        _q("max1", aggs=(AggSpec("MAX", "B", "v"),)),
        _q("max2", aggs=(AggSpec("MAX", "B", "v"),)),
    ]
    sets, singles = sharable_sets(qs)
    by_members = {frozenset(s.qids) for s in sets}
    assert frozenset({"cnt1", "cnt2"}) in by_members
    assert frozenset({"sum1", "avg1"}) in by_members
    assert frozenset({"max1", "max2"}) in by_members
    assert not singles


def test_agg_signature_avg_shares_with_sum_and_count_e():
    s1 = agg_signature(_q("x", aggs=(AggSpec("AVG", "B", "v"),)))
    s2 = agg_signature(_q("y", aggs=(AggSpec("SUM", "B", "v"),)))
    s3 = agg_signature(_q("z", aggs=(AggSpec("COUNT_E", "B"),)))
    assert s1 == s2 == s3
    s4 = agg_signature(_q("w", aggs=(AggSpec("COUNT_STAR"),)))
    assert s4 != s1


def test_no_kleene_queries_are_singletons():
    q = Query(qid="nk", elems=seq(Atom("A"), Atom("B")))
    sets, singles = sharable_sets([q, _q("a"), _q("b", prefix="C")])
    assert [s.qid for s in singles] == ["nk"]
    assert len(sets) == 1


def test_pane_on_sharable_set():
    qs = [_q("a", window=120.0), _q("b", window=120.0)]
    for q in qs:
        q.slide = 60.0
    sets, _ = sharable_sets(qs)
    assert sets[0].pane == pytest.approx(60.0)


def test_template_cache_reused():
    q = _q("a")
    t1 = build_template(q)
    assert build_template(q) is t1
