"""Structured Streaming deployment: the streaming result (update mode,
last update per key) must equal the batch pipeline's result on the same
data, across micro-batches that split the stream chronologically."""
import numpy as np
import pandas as pd
import pytest

from repro.core.aggregates import Avg, Count
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate
from repro.core.query import Query, WindowSpec
from repro.core.spark_runner import run_query
from repro.core.streaming import run_query_streaming


def _stream_pdf(n=120, seed=9):
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "time": np.arange(1, n + 1),
            "grp": g.integers(0, 3, n),
            "etype": g.choice(list("ABC"), n),
            "v": g.integers(0, 10, n).astype("float64"),
        }
    )


def _run_streaming(spark, tmp_path, pdf, query, n_chunks=3):
    """Write the stream as chronological file chunks, process them as
    separate micro-batches (maxFilesPerTrigger=1, availableNow), and
    return the final state of each key from the update-mode output."""
    import os
    import time as _time

    src = tmp_path / "stream_src"
    src.mkdir()
    base = _time.time()
    for i, chunk in enumerate(np.array_split(np.arange(len(pdf)), n_chunks)):
        path = src / f"part-{i:03d}.json"
        pdf.iloc[chunk].to_json(path, orient="records", lines=True)
        # The file source orders micro-batches by modification time; give
        # the chronological chunks strictly increasing mtimes so batches
        # arrive in stream order (the in-order assumption of DESIGN.md).
        os.utime(path, (base + i, base + i))
    schema = spark.createDataFrame(pdf.head(1)).schema
    stream = (
        spark.readStream.schema(schema)
        .option("maxFilesPerTrigger", 1)
        .json(str(src))
    )
    out = run_query_streaming(stream, query)
    sink = f"stream_sink_{abs(hash(str(tmp_path))) % 10**8}"
    q = (
        out.writeStream.format("memory")
        .queryName(sink)
        .outputMode("update")
        .option("checkpointLocation", str(tmp_path / "ckpt"))
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination(120)
    rows = spark.sql(f"SELECT * FROM {sink}").toPandas()
    # Update mode appends one row per key per micro-batch; the final
    # answer is the last row per key.
    keys = [*query.partition_by, "wid"]
    return rows.groupby(keys, as_index=False).last()


@pytest.mark.parametrize(
    "semantics, preds",
    [
        (Semantics.ANY, ()),
        (Semantics.ANY, (AdjacentPredicate("A", "v", "<", "A", "v"),)),
        (Semantics.NEXT, ()),
        (Semantics.CONT, ()),
    ],
    ids=["any-type", "any-mixed", "next", "cont"],
)
def test_streaming_equals_batch(spark, tmp_path, semantics, preds):
    pdf = _stream_pdf()
    query = Query(
        pattern="(SEQ(A+, B))+",
        semantics=semantics,
        aggregates=(Count(), Avg("A", "v")),
        adjacent_predicates=preds,
        partition_by=("grp",),
        window=WindowSpec(size=40, slide=20),
    )
    stream_res = _run_streaming(spark, tmp_path, pdf, query)
    batch_res = run_query(spark.createDataFrame(pdf), query).toPandas()
    keys = ["grp", "wid"]
    cols = keys + ["count_star", "avg_A_v", "events"]
    got = stream_res[cols].sort_values(keys).reset_index(drop=True)
    exp = batch_res[cols].sort_values(keys).reset_index(drop=True)
    pd.testing.assert_frame_equal(
        got.astype({"wid": "int64"}), exp.astype({"wid": "int64"}),
        check_dtype=False,
    )


def test_streaming_state_is_coarse(spark, tmp_path):
    """The per-key state Cogra keeps in the state store is a pickled
    aggregator with Theta(l) aggregates — assert it stays small and does
    not grow with the number of events (the repro hint's point)."""
    import pickle

    from repro.core.executor import make_aggregator

    cq = Query(pattern="(SEQ(A+, B))+", semantics=Semantics.ANY).compile()
    agg = make_aggregator(cq)
    small = len(pickle.dumps(agg))
    n = 5000
    for i in range(n):
        agg.update("A" if i % 2 else "B", {})
    grown = len(pickle.dumps(agg))
    # Only the bignum digits of the two type counts grow (~n bits); the
    # state holds no events — far below GRETA's n * 48B event store.
    assert grown < small + 2 * (n // 8 + 64)
    assert grown < n * 48 / 10
