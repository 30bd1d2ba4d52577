"""Count composition for disjunctive/conjunctive patterns (paper §5).

Let C1 = COUNT(P1) − C12, C2 = COUNT(P2) − C12 and C12 = COUNT(P1,2)
(trends matched by both). Then

- COUNT(P1 ∨ P2) = C1 + C2 + C12                     (each trend once)
- COUNT(P1 ∧ P2) = C1·C2 + C1·C12 + C2·C12 + (C12 2) (pairs of trends)

so the sub-patterns' processing can be shared and the composed counts
derived afterwards. ``trend_key`` canonicalizes an enumerated trend for
set intersection when tests compute C12 by brute force.
"""
from __future__ import annotations

from typing import Sequence

from .events import Event


def trend_key(trend: Sequence[Event]) -> tuple:
    """Hashable identity of a trend: the ordered event (time, type) ids."""
    return tuple((e.time, e.etype) for e in trend)


def count_disjunction(count_p1: int, count_p2: int, count_both: int) -> int:
    c1 = count_p1 - count_both
    c2 = count_p2 - count_both
    return c1 + c2 + count_both


def count_conjunction(count_p1: int, count_p2: int, count_both: int) -> int:
    c1 = count_p1 - count_both
    c2 = count_p2 - count_both
    c12 = count_both
    return c1 * c2 + c1 * c12 + c2 * c12 + c12 * (c12 - 1) // 2
