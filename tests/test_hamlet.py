"""Hamlet shared executor (Algorithm 1) — equivalence with GRETA and
brute force under every sharing mode, plus graphlet/burst/snapshot
mechanics (paper §3.3 and §4.2)."""
import pytest

from repro.core.events import Event
from repro.core.greta import run_greta
from repro.core.hamlet import HamletSetEngine, run_hamlet_set
from repro.core.queries import (
    AggSpec,
    Atom,
    EdgePred,
    Kleene,
    Pred,
    Query,
    seq,
)

from util import assert_matches_brute, random_events, random_query


def _set_of(seed, k):
    return [random_query(seed * 97 + i, qid=f"q{i}") for i in range(k)]


@pytest.mark.parametrize("mode", ["dynamic", "static", "nonshared"])
@pytest.mark.parametrize("seed", range(25))
def test_hamlet_matches_brute_random_workloads(mode, seed):
    events = random_events(seed, n_max=18)
    qs = _set_of(seed, 1 + seed % 4)
    res = run_hamlet_set(events, qs, "B", mode=mode, pane=[3.0, 7.0, 50.0][seed % 3])
    for q in qs:
        assert_matches_brute(events, q, res[q.qid])


@pytest.mark.parametrize("seed", range(15))
def test_dynamic_equals_static_equals_nonshared(seed):
    """Sharing decisions must never change results, only cost."""
    events = random_events(seed + 500, n_max=18)
    qs = _set_of(seed + 500, 3)
    outs = [
        run_hamlet_set(events, qs, "B", mode=m) for m in ("dynamic", "static", "nonshared")
    ]
    for q in qs:
        for other in outs[1:]:
            for key, val in outs[0][q.qid].items():
                got = other[q.qid][key]
                assert (val != val and got != got) or abs(val - got) < 1e-9 * max(1, abs(val))


@pytest.mark.parametrize("seed", range(10))
def test_hamlet_equals_greta_per_query(seed):
    events = random_events(seed + 900, n_max=16)
    qs = _set_of(seed + 900, 2)
    res = run_hamlet_set(events, qs, "B", mode="dynamic")
    for q in qs:
        g = run_greta(events, q)
        for key, val in g.items():
            got = res[q.qid][key]
            assert (val != val and got != got) or abs(val - got) < 1e-9 * max(1, abs(val))


def _ev(t, et, v=0.0):
    return Event(t, et, {"v": v})


def _mk_engine(qs, mode="static", pane=100.0):
    return HamletSetEngine(qs, "B", mode=mode, pane=pane)


Q1 = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
Q2 = Query(qid="q2", elems=seq(Atom("C"), Kleene("B")))


def test_shared_graphlet_stores_events_once():
    eng = _mk_engine([Q1, Q2])
    for e in [_ev(0, "A"), _ev(1, "C"), _ev(2, "B"), _ev(3, "B"), _ev(4, "B")]:
        eng.on_event(e)
    eng.end_window()
    # 2 prefix events stored per matching query (1 each) + 3 B's stored once
    assert eng.m.stored_events == 2 + 3
    assert eng.exact_counts() == {"q1": 7, "q2": 7}


def test_nonshared_mode_replicates_kleene_events():
    eng = _mk_engine([Q1, Q2], mode="nonshared")
    for e in [_ev(0, "A"), _ev(1, "C"), _ev(2, "B"), _ev(3, "B"), _ev(4, "B")]:
        eng.on_event(e)
    eng.end_window()
    assert eng.m.stored_events == 2 + 3 * 2  # B's stored per query


def test_entry_snapshot_created_per_shared_graphlet():
    eng = _mk_engine([Q1, Q2])
    for e in [_ev(0, "A"), _ev(1, "B"), _ev(2, "A"), _ev(3, "B")]:
        eng.on_event(e)
    eng.end_window()
    # two B graphlets (split by the second A) -> two entry snapshots
    assert eng.m.snapshots_created == 2
    assert eng.m.splits == 0  # closures by other-type events are not splits


def test_divergent_predicates_create_event_snapshots():
    q1 = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
    q2 = Query(qid="q2", elems=seq(Atom("A"), Kleene("B")), where={"B": (Pred("v", ">", 5),)})
    eng = _mk_engine([q1, q2])
    for e in [_ev(0, "A"), _ev(1, "B", 9), _ev(2, "B", 1), _ev(3, "B", 9)]:
        eng.on_event(e)
    eng.end_window()
    # entry snapshot + event snapshot for the divergent b(v=1)... at least
    assert eng.m.snapshots_created >= 2
    assert eng.exact_counts()["q1"] == 7
    assert eng.exact_counts()["q2"] == 3  # only the two v=9 B's


def test_edge_pred_query_diverges_every_event():
    q1 = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
    q2 = Query(qid="q2", elems=seq(Atom("A"), Kleene("B")), edge_pred=EdgePred("v", "<="))
    eng = _mk_engine([q1, q2], mode="static")
    evs = [_ev(0, "A"), _ev(1, "B", 5), _ev(2, "B", 3), _ev(3, "B", 7)]
    for e in evs:
        eng.on_event(e)
    eng.end_window()
    # every shared B event needs an event-level snapshot (Definition 9)
    assert eng.m.snapshots_created >= 1 + 3
    assert_matches_brute(evs, q2, run_hamlet_set(evs, [q1, q2], "B", mode="static")["q2"])


def test_dynamic_splits_under_snapshot_pressure():
    """With an edge-pred query in the set, the dynamic optimizer shares
    the clean queries and processes the divergent one separately."""
    q1 = Query(qid="q1", elems=seq(Atom("A"), Kleene("B")))
    q2 = Query(qid="q2", elems=seq(Atom("A"), Kleene("B")))
    q3 = Query(qid="q3", elems=seq(Atom("A"), Kleene("B")), edge_pred=EdgePred("v", "<="))
    evs = [_ev(0, "A")] + [_ev(1 + i, "B", (i * 7) % 10) for i in range(20)]
    eng = HamletSetEngine([q1, q2, q3], "B", mode="dynamic", pane=5.0)
    for e in evs:
        eng.on_event(e)
    eng.end_window()
    dyn_snaps = eng.m.snapshots_created
    eng_s = HamletSetEngine([q1, q2, q3], "B", mode="static", pane=5.0)
    for e in evs:
        eng_s.on_event(e)
    eng_s.end_window()
    assert dyn_snaps < eng_s.m.snapshots_created
    assert eng.exact_counts() == eng_s.exact_counts()


def test_pane_boundary_flushes_burst_but_keeps_graphlet():
    eng = _mk_engine([Q1, Q2], pane=2.0)
    for e in [_ev(0, "A"), _ev(1.0, "B"), _ev(2.5, "B"), _ev(4.5, "B")]:
        eng.on_event(e)
    eng.end_window()
    assert eng.m.bursts == 3  # one per pane
    assert eng.m.snapshots_created == 1  # still a single shared graphlet
    assert eng.exact_counts()["q1"] == 7


def test_exact_counts_beyond_double_precision():
    eng = _mk_engine([Q1, Q2])
    eng.on_event(_ev(0, "A"))
    for i in range(80):
        eng.on_event(_ev(i + 1.0, "B"))
    eng.end_window()
    assert eng.exact_counts()["q1"] == 2**80 - 1


def test_engine_rejects_query_without_kleene():
    with pytest.raises(ValueError):
        HamletSetEngine([Query(qid="x", elems=seq(Atom("A"), Atom("B")))], "B")


def test_engine_rejects_bad_mode():
    with pytest.raises(ValueError):
        HamletSetEngine([Q1], "B", mode="sometimes")


def test_minmax_validation_rejects_non_end_type():
    q = Query(
        qid="q",
        elems=seq(Atom("A"), Kleene("B"), Atom("C")),
        aggs=(AggSpec("MIN", "B", "v"),),  # B is not an end type here
    )
    with pytest.raises(ValueError):
        HamletSetEngine([q], "B")


def test_engine_is_picklable_mid_stream():
    """The streaming runtime pickles live engines between micro-batches."""
    import pickle

    eng = _mk_engine([Q1, Q2], mode="dynamic", pane=2.0)
    for e in [_ev(0, "A"), _ev(1, "B"), _ev(2.5, "B")]:
        eng.on_event(e)
    eng2 = pickle.loads(pickle.dumps(eng))
    for e in [_ev(3.0, "B"), _ev(3.5, "B")]:
        eng.on_event(e)
        eng2.on_event(e)
    eng.end_window()
    eng2.end_window()
    assert eng.exact_counts() == eng2.exact_counts()
