"""Continuous dissemination as a Structured Streaming query.

Topology (matches the repro brief: "Structured Streaming joins between
object stream and clustered user-preference partitions, windowed for
sliding window semantics"):

* a file source streams object micro-batches (JSON rows
  ``{obj_id, ts, vals}``);
* each object row is associated with every cluster partition
  (``explode`` over the static cluster-id list — the stream-static
  replication join);
* ``groupBy(cluster_id).applyInPandasWithState`` runs one
  FilterThenVerify(SW) engine per cluster, its state carried across
  micro-batches as pickled bytes in the state store (so the query
  restarts from the checkpoint with frontiers and Pareto buffers intact);
* count-based sliding-window semantics (Sec. VII) live inside the engine
  state — the window is over arrival order, exactly the paper's
  ``(in - W, in]`` protocol;
* the append-mode sink writes disseminated (cluster, user, object, ts)
  rows as parquet.

``run_stream_to_completion`` wraps the query with an ``availableNow``
trigger for deterministic batch-replay tests and jobs.
"""
from __future__ import annotations

import json
import os
import pickle
from typing import Iterable, Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.streaming.state import GroupStateTimeout

from repro.core.common import Cluster
from repro.dataflow.dissemination import OUTPUT_SCHEMA, _cluster_payload, make_engine

INPUT_SCHEMA = "obj_id string, ts long, vals array<string>"
STATE_SCHEMA = "engine binary"


def write_stream_files(
    stream: Iterable[tuple[str, tuple]], input_dir: str, *, files: int = 1
) -> list[str]:
    """Split the object stream into ``files`` JSON chunk files (one
    micro-batch each under ``maxFilesPerTrigger=1``), named in timestamp
    order so the source discovers them in order."""
    os.makedirs(input_dir, exist_ok=True)
    rows = [
        {"obj_id": str(oid), "ts": t, "vals": list(map(str, vals))}
        for t, (oid, vals) in enumerate(stream, start=1)
    ]
    per = max(1, (len(rows) + files - 1) // files)
    paths = []
    for i in range(0, len(rows), per):
        path = os.path.join(input_dir, f"batch-{i // per:05d}.json")
        with open(path, "w") as f:
            for r in rows[i : i + per]:
                f.write(json.dumps(r) + "\n")
        paths.append(path)
    return paths


def build_query(
    spark: SparkSession,
    clusters: Sequence[Cluster],
    prefs_by_user: Mapping,
    attrs: Sequence[str],
    domains: Mapping,
    *,
    input_dir: str,
    output_dir: str,
    checkpoint_dir: str,
    window: int | None = None,
    max_files_per_trigger: int | None = None,
):
    """Assemble (but do not await) the streaming dissemination query."""
    payloads = _cluster_payload(clusters, prefs_by_user, attrs, domains, window)
    bc = spark.sparkContext.broadcast(payloads)

    def process(key, pdf_iter, state):
        cid = str(key[0])
        if state.exists:
            engine = pickle.loads(state.get[0])
        else:
            engine = make_engine(bc.value[cid])
        seen_before = set(getattr(engine, "disseminated", set()))
        rows = []
        batch = pd.concat(list(pdf_iter), ignore_index=True)
        batch = batch.sort_values("ts")
        for r in batch.itertuples(index=False):
            t = int(r.ts)
            targets = engine.insert(r.obj_id, tuple(r.vals))
            for user in targets:
                rows.append((cid, str(user), r.obj_id, t))
            # Sliding-window mend-time promotions that happened while
            # processing this arrival (C_o grows mid-lifetime, Alg. 4/5).
            if hasattr(engine, "disseminated"):
                emitted = {(u, o) for _, u, o, _ in rows}
                for user, oid in engine.disseminated - seen_before:
                    if (str(user), oid) not in emitted:
                        rows.append((cid, str(user), str(oid), t))
                seen_before = set(engine.disseminated)
        state.update((pickle.dumps(engine),))
        yield pd.DataFrame(rows, columns=["cluster_id", "user_id", "obj_id", "ts"])

    reader = spark.readStream.schema(INPUT_SCHEMA)
    if max_files_per_trigger:
        reader = reader.option("maxFilesPerTrigger", max_files_per_trigger)
    objects = reader.json(input_dir)
    replicated = objects.withColumn(
        "cluster_id", F.explode(F.array(*[F.lit(str(c)) for c in payloads]))
    )
    out = replicated.groupBy("cluster_id").applyInPandasWithState(
        process,
        OUTPUT_SCHEMA,
        STATE_SCHEMA,
        "append",
        GroupStateTimeout.NoTimeout,
    )
    return (
        out.writeStream.format("parquet")
        .option("path", output_dir)
        .option("checkpointLocation", checkpoint_dir)
        .outputMode("append")
    )


def run_stream_to_completion(spark: SparkSession, writer, timeout_s: int = 300) -> None:
    """Start with an availableNow trigger and await all pending input."""
    q = writer.trigger(availableNow=True).start()
    try:
        if not q.awaitTermination(timeout_s):
            raise TimeoutError(f"streaming query did not finish in {timeout_s}s")
    finally:
        if q.isActive:
            q.stop()


def read_disseminations(spark: SparkSession, output_dir: str) -> DataFrame:
    return spark.read.schema(OUTPUT_SCHEMA).parquet(output_dir)
