"""Structured Streaming runtime: Hamlet as a stateful operator.

This is the reproduction-band mapping: *adaptive shared trend
aggregation as a Structured Streaming stateful operator with dynamic
sharing plan selection per micro-batch*. A file source delivers one
**pane** per micro-batch (``maxFilesPerTrigger=1``); the stream is keyed
by the group attribute and processed with ``applyInPandasWithState``.
The group state carries the pickled per-window Hamlet engines; inside
every micro-batch the dynamic optimizer re-decides the sharing plan for
each burst (``choose_plan``), so plans adapt micro-batch by micro-batch
exactly as the paper's optimizer adapts per burst. Completed windows
are emitted in update mode; a far-future flush sentinel closes the final
windows (the offline stand-in for a watermark).
"""
from __future__ import annotations

import math
import os
import pickle
from typing import Sequence

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout
from pyspark.sql.types import (
    BinaryType,
    DoubleType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from ..core.events import Event
from ..core.queries import Query

FLUSH_TYPE = "__flush__"

EVENT_SCHEMA = StructType(
    [
        StructField("time", DoubleType()),
        StructField("etype", StringType()),
        StructField("gkey", LongType()),
        StructField("v", DoubleType()),
        StructField("w", DoubleType()),
    ]
)
OUT_SCHEMA = StructType(
    [
        StructField("gkey", LongType()),
        StructField("window_start", DoubleType()),
        StructField("qid", StringType()),
        StructField("agg", StringType()),
        StructField("value", DoubleType()),
    ]
)
STATE_SCHEMA = StructType([StructField("blob", BinaryType())])


def _new_window_engines(workload: Sequence[Query], mode: str):
    """Live engines for one window instance (one per engine group)."""
    from ..core.engine import _engine_groups
    from ..core.greta import GretaState
    from ..core.hamlet import HamletSetEngine

    engines = []
    for queries, ketype, pane in _engine_groups(workload):
        if ketype is None:
            engines.append(("greta", queries[0].qid, GretaState(queries[0])))
        else:
            engines.append(
                (
                    "hamlet",
                    None,
                    HamletSetEngine(
                        queries,
                        ketype,
                        mode=mode if len(queries) > 1 else "nonshared",
                        pane=pane,
                    ),
                )
            )
    return engines


def make_stateful_func(workload: Sequence[Query], system: str, window: float):
    """Build the applyInPandasWithState function.

    Tumbling windows only (all queries share window==slide==``window``).
    The group state carries *live* pickled engines, so graphlets span
    micro-batches and the dynamic optimizer re-selects its sharing plan
    for every burst of every micro-batch. Windows whose end time has
    passed are finalized and their aggregates emitted.
    """
    workload = list(workload)
    for q in workload:
        if q.window != window or q.slide != window:
            raise ValueError("streaming runtime supports one tumbling window size")
    mode = {
        "hamlet": "dynamic",
        "hamlet-static": "static",
        "hamlet-nonshared": "nonshared",
    }[system]

    def func(key, pdf_iter, state: GroupState):
        gkey = int(key[0])
        if state.exists:
            st = pickle.loads(state.get[0])
        else:
            st = {"engines": {}, "done": set(), "max_t": -math.inf}
        events: list[Event] = []
        for pdf in pdf_iter:
            for row in pdf.itertuples(index=False):
                st["max_t"] = max(st["max_t"], float(row.time))
                if row.etype != FLUSH_TYPE:
                    events.append(
                        Event(float(row.time), row.etype, {"v": float(row.v), "w": float(row.w)})
                    )
        events.sort(key=lambda e: e.time)
        for e in events:
            wid = int(e.time // window)
            if wid in st["done"]:
                continue  # late event past emission — dropped
            if wid not in st["engines"]:
                st["engines"][wid] = _new_window_engines(workload, mode)
            for kind, qid, eng in st["engines"][wid]:
                eng.on_event(e)
        rows = []
        for wid in sorted(st["engines"]):
            if (wid + 1) * window <= st["max_t"]:
                ws = wid * window
                for kind, qid, eng in st["engines"].pop(wid):
                    if kind == "greta":
                        per_query = {qid: eng.results()}
                    else:
                        eng.end_window()
                        per_query = eng.results()
                    for q_id, aggs in per_query.items():
                        for agg, val in aggs.items():
                            rows.append((gkey, float(ws), q_id, agg, float(val)))
                st["done"].add(wid)
        state.update((pickle.dumps(st),))
        yield pd.DataFrame(
            rows, columns=["gkey", "window_start", "qid", "agg", "value"]
        )

    return func


def write_pane_files(pdf: pd.DataFrame, pane: float, out_dir: str, window: float) -> int:
    """Split a stream frame into one JSON-lines file per pane (the
    micro-batch unit) plus a flush sentinel pane; returns the file count."""
    os.makedirs(out_dir, exist_ok=True)
    pdf = pdf.sort_values("time", kind="mergesort")
    pane_ids = (pdf["time"] // pane).astype(int)
    n = 0
    # FileStreamSource drains pending files oldest-modification-first; give
    # the panes strictly increasing mtimes so micro-batches arrive in pane
    # order (the engine state assumes in-order event time across batches).
    base_mtime = 1_600_000_000
    for pid in sorted(pane_ids.unique()):
        chunk = pdf[pane_ids == pid]
        path = os.path.join(out_dir, f"{n:05d}.json")
        chunk.to_json(path, orient="records", lines=True)
        os.utime(path, (base_mtime + n, base_mtime + n))
        n += 1
    t_flush = (math.floor(pdf["time"].max() / window) + 2) * window
    flush = pd.DataFrame(
        {
            "time": [t_flush] * pdf["gkey"].nunique(),
            "etype": [FLUSH_TYPE] * pdf["gkey"].nunique(),
            "gkey": sorted(pdf["gkey"].unique()),
            "v": 0.0,
            "w": 0.0,
        }
    )
    path = os.path.join(out_dir, f"{n:05d}.json")
    flush.to_json(path, orient="records", lines=True)
    os.utime(path, (base_mtime + n, base_mtime + n))
    return n + 1


def run_stream(
    spark: SparkSession,
    in_dir: str,
    workload: Sequence[Query],
    *,
    system: str = "hamlet",
    window: float,
    checkpoint_dir: str,
) -> pd.DataFrame:
    """Run the streaming query over the pane files; returns collected rows."""
    src = (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .json(in_dir)
    )
    out = src.groupBy("gkey").applyInPandasWithState(
        make_stateful_func(workload, system, window),
        OUT_SCHEMA,
        STATE_SCHEMA,
        "update",
        GroupStateTimeout.NoTimeout,
    )
    collected: list[pd.DataFrame] = []

    def sink(batch_df, _bid):
        pdf = batch_df.toPandas()
        if len(pdf):
            collected.append(pdf)

    q = (
        out.writeStream.foreachBatch(sink)
        .option("checkpointLocation", checkpoint_dir)
        .outputMode("update")
        .start()
    )
    try:
        q.processAllAvailable()
    finally:
        q.stop()
    if not collected:
        return pd.DataFrame(columns=["gkey", "window_start", "qid", "agg", "value"])
    return pd.concat(collected, ignore_index=True)
