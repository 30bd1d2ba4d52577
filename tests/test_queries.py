"""Unit tests for the query model (Definitions 1–3)."""
import pytest

from repro.core.events import Event
from repro.core.queries import (
    AggSpec,
    Atom,
    EdgePred,
    GroupKleene,
    Kleene,
    Neg,
    Pred,
    Query,
    seq,
)


@pytest.mark.parametrize(
    "op,val,attr_val,expected",
    [
        ("<", 5, 4, True),
        ("<", 5, 5, False),
        ("<=", 5, 5, True),
        (">", 5, 6, True),
        (">", 5, 5, False),
        (">=", 5, 5, True),
        ("==", 5, 5, True),
        ("==", 5, 4, False),
        ("!=", 5, 4, True),
        ("!=", 5, 5, False),
    ],
)
def test_pred_ops(op, val, attr_val, expected):
    p = Pred("v", op, val)
    assert p.ok(Event(0.0, "A", {"v": attr_val})) is expected


def test_pred_missing_attr_defaults_to_zero():
    assert Pred("missing", "<", 1).ok(Event(0.0, "A", {})) is True
    assert Pred("missing", ">", 1).ok(Event(0.0, "A", {})) is False


@pytest.mark.parametrize(
    "op,prev,cur,expected",
    [("<=", 3, 3, True), ("<=", 4, 3, False), (">", 4, 3, True), ("<", 3, 4, True)],
)
def test_edge_pred(op, prev, cur, expected):
    ep = EdgePred("v", op)
    assert ep.ok(Event(0, "B", {"v": prev}), Event(1, "B", {"v": cur})) is expected


def test_query_matches_applies_per_type_predicates():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B")), where={"B": (Pred("v", ">", 2),)})
    assert q.matches(Event(0, "B", {"v": 3}))
    assert not q.matches(Event(0, "B", {"v": 2}))
    assert q.matches(Event(0, "A", {"v": 0}))  # no predicate on A


def test_kleene_types_simple_and_nested():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B")))
    assert q.kleene_types() == frozenset({"B"})
    q2 = Query(qid="q2", elems=seq(GroupKleene(seq(Atom("A"), Kleene("B")))))
    assert q2.kleene_types() == frozenset({"B"})


def test_query_identity_is_qid():
    a = Query(qid="x", elems=seq(Kleene("B")))
    b = Query(qid="x", elems=seq(Atom("A"), Kleene("B")))
    assert a == b and hash(a) == hash(b)
    assert a != Query(qid="y", elems=seq(Kleene("B")))


@pytest.mark.parametrize(
    "spec,name",
    [
        (AggSpec("COUNT_STAR"), "COUNT(*)"),
        (AggSpec("COUNT_E", "B"), "COUNT(B)"),
        (AggSpec("SUM", "B", "v"), "SUM(B.v)"),
        (AggSpec("AVG", "T", "speed"), "AVG(T.speed)"),
        (AggSpec("MIN", "B", "v"), "MIN(B.v)"),
        (AggSpec("MAX", "B", "v"), "MAX(B.v)"),
    ],
)
def test_aggspec_names(spec, name):
    assert spec.name == name


def test_aggspec_validation():
    with pytest.raises(ValueError):
        AggSpec("MEDIAN")
    with pytest.raises(ValueError):
        AggSpec("SUM")  # needs an event type


def test_event_pickle_roundtrip():
    import pickle

    e = Event(1.5, "B", {"v": 2.0})
    e2 = pickle.loads(pickle.dumps(e))
    assert (e2.time, e2.etype, e2.attrs) == (1.5, "B", {"v": 2.0})


def test_query_pickle_roundtrip():
    import pickle

    q = Query(
        qid="q",
        elems=seq(Atom("A"), Neg("N"), Kleene("B")),
        where={"B": (Pred("v", ">", 1),)},
        edge_pred=EdgePred("v", "<="),
    )
    q2 = pickle.loads(pickle.dumps(q))
    assert q2.qid == "q" and q2.edge_pred == q.edge_pred and q2.elems == q.elems
