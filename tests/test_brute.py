"""Sanity checks of the brute-force trend enumerator itself (hand-computed
tiny cases — this is the oracle the engines are validated against, so it
gets its own ground truth)."""
import math

from repro.core.brute import brute_results, enumerate_trends
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


def ev(t, et, v=0.0):
    return Event(t, et, {"v": v})


Q_AB = Query(qid="q", elems=seq(Atom("A"), Kleene("B")))


def test_single_a_two_b():
    # trends: (a,b1), (a,b2), (a,b1,b2)
    trends = enumerate_trends([ev(0, "A"), ev(1, "B"), ev(2, "B")], Q_AB)
    assert len(trends) == 3


def test_two_a_one_b():
    trends = enumerate_trends([ev(0, "A"), ev(1, "A"), ev(2, "B")], Q_AB)
    assert len(trends) == 2


def test_doubling_with_k_bs():
    # count = Σ_i 2^(i-1) for 4 B's after one A = 15
    evs = [ev(0, "A")] + [ev(i + 1, "B") for i in range(4)]
    assert brute_results(evs, Q_AB)["COUNT(*)"] == 15.0


def test_no_start_no_trends():
    assert enumerate_trends([ev(1, "B"), ev(2, "B")], Q_AB) == []


def test_order_matters():
    assert enumerate_trends([ev(0, "B"), ev(1, "A")], Q_AB) == []


def test_suffix_pattern():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B"), Atom("C")))
    evs = [ev(0, "A"), ev(1, "B"), ev(2, "B"), ev(3, "C")]
    # trends: (a,b1,c), (a,b2,c), (a,b1,b2,c)
    assert len(enumerate_trends(evs, q)) == 3


def test_unary_pred_filters_events():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B")), where={"B": (Pred("v", ">", 0),)})
    evs = [ev(0, "A"), ev(1, "B", 0.0), ev(2, "B", 1.0)]
    assert len(enumerate_trends(evs, q)) == 1


def test_edge_pred_restricts_adjacency():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B")), edge_pred=EdgePred("v", "<="))
    evs = [ev(0, "A"), ev(1, "B", 5.0), ev(2, "B", 3.0)]
    # (a,b1), (a,b2) ok; (a,b1,b2) violates 5<=3
    assert len(enumerate_trends(evs, q)) == 2


def test_mid_negation_blocks():
    q = Query(qid="q", elems=seq(Atom("A"), Neg("N"), Kleene("B")))
    evs = [ev(0, "A"), ev(1, "N"), ev(2, "B")]
    assert enumerate_trends(evs, q) == []
    evs2 = [ev(0, "N"), ev(1, "A"), ev(2, "B")]
    assert len(enumerate_trends(evs2, q)) == 1


def test_trailing_negation_voids_earlier_trends():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B"), Neg("N")))
    evs = [ev(0, "A"), ev(1, "B"), ev(2, "N"), ev(3, "B")]
    # trend (a,b1) voided by n; (a,b3) and (a,b1,b3) survive
    assert len(enumerate_trends(evs, q)) == 2


def test_nested_kleene_counts_more():
    q_flat = Query(qid="f", elems=seq(Atom("A"), Kleene("B")))
    q_nest = Query(qid="n", elems=seq(GroupKleene(seq(Atom("A"), Kleene("B")))))
    evs = [ev(0, "A"), ev(1, "B"), ev(2, "A"), ev(3, "B")]
    flat = len(enumerate_trends(evs, q_flat))
    nest = len(enumerate_trends(evs, q_nest))
    # nested adds e.g. (a1,b1,a2,b2)
    assert nest > flat


def test_aggregates_from_trends():
    q = Query(
        qid="q",
        elems=seq(Atom("A"), Kleene("B")),
        aggs=(
            AggSpec("COUNT_STAR"),
            AggSpec("COUNT_E", "B"),
            AggSpec("SUM", "B", "v"),
            AggSpec("AVG", "B", "v"),
            AggSpec("MIN", "B", "v"),
            AggSpec("MAX", "B", "v"),
        ),
    )
    evs = [ev(0, "A"), ev(1, "B", 2.0), ev(2, "B", 4.0)]
    r = brute_results(evs, q)
    # trends: (a,b1) (a,b2) (a,b1,b2): B occurrences = 1+1+2 = 4
    assert r["COUNT(*)"] == 3.0
    assert r["COUNT(B)"] == 4.0
    assert r["SUM(B.v)"] == 2 + 4 + 2 + 4
    assert r["AVG(B.v)"] == (2 + 4 + 2 + 4) / 4
    assert r["MIN(B.v)"] == 2.0 and r["MAX(B.v)"] == 4.0


def test_empty_stream_aggregates():
    q = Query(qid="q", elems=seq(Atom("A"), Kleene("B")), aggs=(AggSpec("COUNT_STAR"), AggSpec("AVG", "B", "v")))
    r = brute_results([], q)
    assert r["COUNT(*)"] == 0.0 and math.isnan(r["AVG(B.v)"])
