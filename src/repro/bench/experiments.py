"""Per-figure experiment definitions (paper §6.2).

Each function regenerates the data series behind one (or two) of the
paper's evaluation figures as printed table rows; ``scale`` selects
``"full"`` (EXPERIMENTS.md numbers, minutes of runtime) or ``"small"``
(benchmark/CI smoke, seconds). Rates are the paper's divided by the
documented scaling factor (DESIGN.md substitutions) so that every
system stays in its asymptotic regime on the Python substrate.
"""
from __future__ import annotations

from typing import Sequence

from ..core.workloads import workload1, workload2
from ..streams import (
    nyc_taxi_stream,
    ridesharing_stream,
    smart_home_stream,
    stock_stream,
)
from .harness import row, run_partitioned

FOUR_SYSTEMS = ("hamlet", "greta", "mcep", "sharon")


def _rideshare_cfg(scale: str) -> dict:
    # calibrated so that per-group trend counts stay enumerable for MCEP
    # while GRETA's quadratic loop is clearly engaged (DESIGN.md)
    if scale == "small":
        return dict(minutes=1.0, n_groups=8, burst_mean=2.0, p_kleene=0.2, burst_cap=5)
    return dict(minutes=2.0, n_groups=16, burst_mean=3.0, p_kleene=0.15, burst_cap=8)


def fig9_fig10(scale: str = "full") -> list[dict]:
    """T9 (Fig. 9 latency/throughput) + T10 (Fig. 10 memory): the four
    systems on the ridesharing stream, varying rate and #queries.

    Paper x-axes: 10K–20K events/min and 5–25 queries; rates here are
    ÷50. SHARON's flattening length is its compile-time estimate: the
    per-window global Kleene event count (see baselines.sharon).
    """
    cfg = _rideshare_cfg(scale)
    rows: list[dict] = []
    epm_list = [200, 250, 300, 350, 400] if scale == "full" else [150]
    k_list = [5, 10, 15, 20, 25] if scale == "full" else [5]
    window = 60.0

    def run_point(panel: str, x_name: str, x: int, epm: int, k: int) -> None:
        pdf = ridesharing_stream(events_per_min=epm, seed=42, **cfg)
        wl = workload1(k, kleene_type="T", window=window, slide=window)
        n_windows = max(int(cfg["minutes"] * 60 / window), 1)
        kleene_per_window = int((pdf["etype"] == "T").sum() / n_windows) + 1
        for system in FOUR_SYSTEMS:
            if system == "sharon":
                rr = run_partitioned(pdf, wl, system, sharon_l=kleene_per_window)
            elif system == "mcep":
                rr = run_partitioned(pdf, wl, system, mcep_max_trends=1_000_000)
            else:
                rr = run_partitioned(pdf, wl, system)
            rows.append(
                row(table="T9/T10", panel=panel, x_name=x_name, x=x, system=system, rr=rr)
            )

    for epm in epm_list:
        run_point("a/c (vs rate)", "events_per_min", epm, epm, k=10 if scale == "full" else 5)
    for k in k_list:
        run_point("b/d (vs queries)", "n_queries", k, epm_list[0], k)
    return rows


def fig11(scale: str = "full") -> list[dict]:
    """T11 (Fig. 11): Hamlet vs GRETA on the NYC-taxi-like and
    smart-home-like streams, varying rate and #queries (25–100)."""
    rows: list[dict] = []
    window = 240.0 if scale == "full" else 60.0
    datasets = {
        "NYC": (nyc_taxi_stream, dict()),
        "SH": (smart_home_stream, dict()),
    }
    epm_list = [100, 150, 200, 250] if scale == "full" else [120]
    k_list = [25, 50, 75, 100] if scale == "full" else [10]
    minutes = 8.0 if scale == "full" else 1.0
    for ds_name, (gen, extra) in datasets.items():
        kleene = "M" if ds_name == "SH" else "T"
        prefixes = ("S", "E", "F0", "F1") if ds_name == "SH" else ("R", "P", "D", "C")
        for epm in epm_list:
            pdf = gen(minutes=minutes, events_per_min=epm, **extra)
            wl = workload1(50 if scale == "full" else 10, kleene_type=kleene,
                           prefixes=prefixes, window=window, slide=window)
            for system in ("hamlet", "greta"):
                rr = run_partitioned(pdf, wl, system)
                rows.append(row(table="T11", panel=f"{ds_name} vs rate",
                                x_name="events_per_min", x=epm, system=system, rr=rr))
        for k in k_list:
            pdf = gen(minutes=minutes, events_per_min=epm_list[min(1, len(epm_list) - 1)], **extra)
            wl = workload1(k, kleene_type=kleene, prefixes=prefixes,
                           window=window, slide=window)
            for system in ("hamlet", "greta"):
                rr = run_partitioned(pdf, wl, system)
                rows.append(row(table="T11", panel=f"{ds_name} vs queries",
                                x_name="n_queries", x=k, system=system, rr=rr))
    return rows


def fig12_fig13(scale: str = "full") -> list[dict]:
    """T12 (Fig. 12 latency/throughput) + T13 (Fig. 13 memory +
    snapshots): Hamlet dynamic vs static sharing on the stock stream
    with the diverse workload 2 (paper x-axes 2K–4K events/min ÷ ~20
    and 20–100 queries)."""
    rows: list[dict] = []
    window = 60.0
    epm_list = [100, 125, 150, 175, 200] if scale == "full" else [100]
    k_list = [20, 40, 60, 80, 100] if scale == "full" else [12]
    minutes = 4.0 if scale == "full" else 1.0
    n_groups = 4

    def run_point(panel: str, x_name: str, x: int, epm: int, k: int) -> None:
        pdf = stock_stream(minutes=minutes, events_per_min=epm, n_groups=n_groups,
                           burst_mean=30.0, p_kleene=0.55, seed=7)
        wl = workload2(k, kleene_type="T", windows=(window, 2 * window), seed=5)
        for system, label in (("hamlet", "dynamic"), ("hamlet-static", "static")):
            rr = run_partitioned(pdf, wl, system)
            rows.append(
                row(table="T12/T13", panel=panel, x_name=x_name, x=x, system=label, rr=rr)
            )

    for epm in epm_list:
        run_point("a/c (vs rate)", "events_per_min", epm, epm, k=40 if scale == "full" else 12)
    for k in k_list:
        run_point("b/d (vs queries)", "n_queries", k, epm_list[len(epm_list) // 2], k)
    return rows
