"""Structured Streaming stateful operator: one pane per micro-batch,
live Hamlet engine state across batches, dynamic sharing per burst —
output must equal the batch engine's."""
import pandas as pd
import pytest

from repro.core.workloads import workload1
from repro.sparkrt.batch import run_workload_spark
from repro.sparkrt.streaming import run_stream, write_pane_files
from repro.streams import ridesharing_stream, to_spark

WINDOW = 20.0
PANE = 10.0


@pytest.fixture(scope="module")
def stream_pdf():
    return ridesharing_stream(
        minutes=1.0, events_per_min=180, n_groups=3, burst_mean=3.0,
        p_kleene=0.3, burst_cap=6, seed=23,
    )


@pytest.fixture(scope="module")
def workload():
    return workload1(3, kleene_type="T", window=WINDOW, slide=WINDOW)


@pytest.fixture(scope="module")
def streamed(spark, stream_pdf, workload, tmp_path_factory):
    base = tmp_path_factory.mktemp("stream")
    in_dir, ckpt = str(base / "in"), str(base / "ckpt")
    n_files = write_pane_files(stream_pdf, PANE, in_dir, WINDOW)
    assert n_files >= 3  # several micro-batches, not one big batch
    out = run_stream(
        spark, in_dir, workload, system="hamlet", window=WINDOW, checkpoint_dir=ckpt
    )
    return out


def test_streaming_equals_batch(spark, stream_pdf, workload, streamed):
    batch = run_workload_spark(
        spark, to_spark(spark, stream_pdf), workload, system="hamlet"
    ).toPandas()
    key = ["gkey", "window_start", "qid", "agg"]
    got = streamed.sort_values(key).reset_index(drop=True)
    want = batch.sort_values(key).reset_index(drop=True)
    pd.testing.assert_frame_equal(
        got[key + ["value"]], want[key + ["value"]], check_dtype=False
    )


def test_streaming_emits_all_windows(streamed, stream_pdf):
    t_max = stream_pdf["time"].max()
    expected_windows = {w * WINDOW for w in range(int(t_max // WINDOW) + 1)}
    got_windows = set(streamed["window_start"].unique())
    # every window that contains events must have been closed by the flush
    assert got_windows <= expected_windows and len(got_windows) >= 2


def test_streaming_rejects_mixed_windows(spark, tmp_path):
    from repro.core.queries import Atom, Kleene, Query, seq
    from repro.sparkrt.streaming import make_stateful_func

    wl = [
        Query(qid="a", elems=seq(Atom("R"), Kleene("T")), window=20.0, slide=20.0),
        Query(qid="b", elems=seq(Atom("P"), Kleene("T")), window=40.0, slide=40.0),
    ]
    with pytest.raises(ValueError):
        make_stateful_func(wl, "hamlet", 20.0)
