"""Stream generators: determinism, schema, rates, burstiness."""
import numpy as np
import pandas as pd
import pytest

from repro.streams import (
    ATTR_COLS,
    bursty_stream,
    group_events,
    nyc_taxi_stream,
    ridesharing_stream,
    smart_home_stream,
    stock_stream,
)

GENS = {
    "ridesharing": (ridesharing_stream, "T"),
    "nyc": (nyc_taxi_stream, "T"),
    "smart_home": (smart_home_stream, "M"),
    "stock": (stock_stream, "T"),
}


@pytest.mark.parametrize("name", sorted(GENS))
def test_schema_and_rate(name):
    gen, kleene = GENS[name]
    pdf = gen(minutes=1.0, events_per_min=200)
    assert list(pdf.columns) == ["time", "etype", "gkey", "v", "w"]
    assert abs(len(pdf) - 200) <= pdf["gkey"].nunique()  # multinomial + min-1
    assert (pdf[kleene == pdf["etype"]].shape[0]) > 0


@pytest.mark.parametrize("name", sorted(GENS))
def test_determinism(name):
    gen, _ = GENS[name]
    a = gen(minutes=1.0, events_per_min=150)
    b = gen(minutes=1.0, events_per_min=150)
    pd.testing.assert_frame_equal(a, b)


def test_different_seeds_differ():
    a = ridesharing_stream(minutes=1.0, events_per_min=150, seed=1)
    b = ridesharing_stream(minutes=1.0, events_per_min=150, seed=2)
    assert not a["etype"].equals(b["etype"])


def test_times_sorted_globally_and_increasing_per_group():
    pdf = ridesharing_stream(minutes=1.0, events_per_min=300, n_groups=5)
    assert (pdf["time"].diff().dropna() >= 0).all()
    for _, sub in pdf.groupby("gkey"):
        assert (sub["time"].diff().dropna() > 0).all()


def test_burst_cap_respected():
    pdf = bursty_stream(
        minutes=1.0, events_per_min=400, n_groups=2, kleene_type="T",
        other_types=["A", "B"], p_kleene=0.5, burst_mean=20.0, burst_cap=4, seed=0,
    )
    for _, sub in pdf.groupby("gkey"):
        runs = (sub["etype"] != sub["etype"].shift()).cumsum()
        run_lens = sub.groupby(runs)["etype"].agg(["first", "size"])
        t_runs = run_lens[run_lens["first"] == "T"]["size"]
        assert (t_runs <= 4).all()


def test_burst_mean_scales_run_length():
    def mean_run(bm):
        pdf = bursty_stream(
            minutes=1.0, events_per_min=600, n_groups=1, kleene_type="T",
            other_types=["A"], p_kleene=0.4, burst_mean=bm, seed=3,
        )
        runs = (pdf["etype"] != pdf["etype"].shift()).cumsum()
        rl = pdf.groupby(runs)["etype"].agg(["first", "size"])
        return rl[rl["first"] == "T"]["size"].mean()

    assert mean_run(12.0) > 2 * mean_run(1.0)


def test_group_events_partitions_and_orders():
    pdf = ridesharing_stream(minutes=1.0, events_per_min=100, n_groups=4)
    by_g = group_events(pdf)
    assert set(by_g) == set(pdf["gkey"].unique())
    total = sum(len(v) for v in by_g.values())
    assert total == len(pdf)
    for evs in by_g.values():
        times = [e.time for e in evs]
        assert times == sorted(times)
        assert all(set(e.attrs) == set(ATTR_COLS) for e in evs)


def test_attr_ranges_per_dataset():
    stock = stock_stream(minutes=1.0, events_per_min=100)
    assert stock["v"].between(10.0, 500.0).all()
    rides = ridesharing_stream(minutes=1.0, events_per_min=100)
    assert rides["v"].between(0.0, 30.0).all()


def test_ridesharing_has_20_event_types():
    pdf = ridesharing_stream(minutes=2.0, events_per_min=2000, n_groups=2, seed=9)
    assert pdf["etype"].nunique() == 20
