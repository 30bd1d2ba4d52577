"""Dynamic sharing optimizer: cost model properties, per-burst decisions,
query-set choice, Theorems 4.1/4.2 behaviour (paper §4)."""
import pytest

from repro.core.optimizer import BurstStats, CostModel, choose_plan

COST = CostModel()


def _stats(k=4, b=6, divergent=(), edge_pred=()):
    mv = {}
    for i in range(k):
        qid = f"q{i}"
        if qid in divergent:
            vec = tuple(j != 0 for j in range(b))  # first event mismatches
        else:
            vec = (True,) * b
        mv[qid] = vec
    return BurstStats(b=b, match_vectors=mv, edge_pred_qids=frozenset(edge_pred))


def test_benefit_grows_with_k():
    b1 = COST.benefit(b=10, n=100, g=10, s_c=0, s_p=1, k=2, p=2)
    b2 = COST.benefit(b=10, n=100, g=10, s_c=0, s_p=1, k=10, p=2)
    assert b2 > b1 > 0


def test_benefit_shrinks_with_snapshots():
    clean = COST.benefit(b=10, n=100, g=10, s_c=0, s_p=1, k=3, p=2)
    snappy = COST.benefit(b=10, n=100, g=10, s_c=10, s_p=10, k=3, p=2)
    assert snappy < clean


def test_benefit_can_go_negative():
    assert COST.benefit(b=4, n=10, g=200, s_c=4, s_p=20, k=2, p=3) < 0


def test_static_mode_always_shares_all():
    plan = choose_plan(_stats(), mode="static", n_so_far=1, g_active=0, s_p_live=0, p_avg=2)
    assert len(plan.shared) == 4


def test_nonshared_mode_never_shares():
    plan = choose_plan(_stats(), mode="nonshared", n_so_far=1, g_active=0, s_p_live=0, p_avg=2)
    assert plan.shared == frozenset()


def test_single_query_cannot_share():
    plan = choose_plan(_stats(k=1), mode="dynamic", n_so_far=10, g_active=0, s_p_live=0, p_avg=2)
    assert plan.shared == frozenset()


def test_clean_burst_is_shared_by_all():
    plan = choose_plan(_stats(k=5), mode="dynamic", n_so_far=50, g_active=0, s_p_live=1, p_avg=2)
    assert len(plan.shared) == 5 and plan.s_c_est == 0


def test_thm41_no_snapshot_queries_always_in_plan():
    plan = choose_plan(
        _stats(k=5, divergent=("q4",)), mode="dynamic", n_so_far=50, g_active=0, s_p_live=1, p_avg=2
    )
    assert {"q0", "q1", "q2", "q3"} <= set(plan.shared)


def test_thm42_cheap_divergence_still_shared():
    # small graphlet, big n: snapshot cost << recomputation cost
    plan = choose_plan(
        _stats(k=3, b=4, divergent=("q2",)), mode="dynamic",
        n_so_far=500, g_active=0, s_p_live=1, p_avg=1,
    )
    assert "q2" in plan.shared


def test_thm42_expensive_divergence_excluded():
    # huge active graphlet: per-snapshot resolution dominates
    plan = choose_plan(
        _stats(k=3, b=2, divergent=("q2",)), mode="dynamic",
        n_so_far=4, g_active=10_000, s_p_live=1, p_avg=4,
    )
    assert "q2" not in plan.shared


def test_edge_pred_queries_count_as_full_divergence():
    stats = _stats(k=3, b=8, edge_pred=("q1",))
    plan = choose_plan(stats, mode="dynamic", n_so_far=4, g_active=5_000, s_p_live=1, p_avg=4)
    assert "q1" not in plan.shared and plan.m_snapshot_queries == 1


def test_split_when_overall_benefit_negative():
    # every query diverges on most events -> sharing cannot pay off
    b = 6
    mv = {f"q{i}": tuple((j + i) % 2 == 0 for j in range(b)) for i in range(4)}
    stats = BurstStats(b=b, match_vectors=mv, edge_pred_qids=frozenset())
    plan = choose_plan(stats, mode="dynamic", n_so_far=2, g_active=50_000, s_p_live=40, p_avg=4)
    assert plan.shared == frozenset()


def test_plans_considered_is_m_plus_one():
    plan = choose_plan(
        _stats(k=6, divergent=("q1", "q3", "q5")), mode="dynamic",
        n_so_far=50, g_active=0, s_p_live=1, p_avg=2,
    )
    assert plan.plans_considered == 4


def test_simple_model_matches_refined_direction():
    """Both Def. 11 and Def. 12 models agree sharing clean big bursts wins."""
    kw = dict(b=20, n=200, g=20, s_c=0, s_p=1, k=8)
    assert COST.benefit(p=2, **kw) > 0
    assert COST.benefit_simple(t=2, **kw) > 0
