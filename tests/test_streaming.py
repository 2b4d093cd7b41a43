"""Structured Streaming pipeline: availableNow replay equals the driver
engines; engine state survives a query restart via the checkpoint."""
import pytest

from repro.core.baseline import BaselineEngine
from repro.core.sliding import BaselineSWEngine
from repro.dataflow.streaming import (
    build_query,
    read_disseminations,
    run_stream_to_completion,
    write_stream_files,
)
from repro.datasets import movie
from repro.experiments.harness import build_dendrogram, clusters_for


@pytest.fixture(scope="module")
def ds():
    return movie.generate(n_users=10, n_groups=2, n_stream=80)


@pytest.fixture(scope="module")
def clusters(ds):
    return clusters_for(ds, build_dendrogram(ds), 0.6, approximate=False)


def _driver_pairs(ds, window=None):
    if window is None:
        eng = BaselineEngine(ds.attrs, ds.prefs, ds.domains)
        pairs = set()
        for oid, vals in ds.stream:
            for c in eng.insert(oid, vals):
                pairs.add((c, oid))
        return pairs
    eng = BaselineSWEngine(ds.attrs, ds.prefs, ds.domains, window=window)
    for oid, vals in ds.stream:
        eng.insert(oid, vals)
    return set(eng.disseminated)


def _collect_pairs(spark, out_dir):
    got = read_disseminations(spark, out_dir).toPandas()
    return {(r.user_id, r.obj_id) for r in got.itertuples(index=False)}


def test_single_run_matches_driver(spark, ds, clusters, tmp_path):
    write_stream_files(ds.stream, str(tmp_path / "in"), files=1)
    writer = build_query(
        spark,
        clusters,
        ds.prefs,
        ds.attrs,
        ds.domains,
        input_dir=str(tmp_path / "in"),
        output_dir=str(tmp_path / "out"),
        checkpoint_dir=str(tmp_path / "ckpt"),
    )
    run_stream_to_completion(spark, writer)
    assert _collect_pairs(spark, str(tmp_path / "out")) == _driver_pairs(ds)


def test_sliding_window_stream_matches_driver(spark, ds, clusters, tmp_path):
    window = 25
    write_stream_files(ds.stream, str(tmp_path / "in"), files=1)
    writer = build_query(
        spark,
        clusters,
        ds.prefs,
        ds.attrs,
        ds.domains,
        input_dir=str(tmp_path / "in"),
        output_dir=str(tmp_path / "out"),
        checkpoint_dir=str(tmp_path / "ckpt"),
        window=window,
    )
    run_stream_to_completion(spark, writer)
    assert _collect_pairs(spark, str(tmp_path / "out")) == _driver_pairs(ds, window)


def test_state_survives_restart(spark, ds, clusters, tmp_path):
    """First run sees only the first half of the stream; the second run
    (same checkpoint) sees the rest — the union must equal a single
    driver replay, which requires frontier state to persist."""
    in_dir, out_dir, ckpt = (str(tmp_path / p) for p in ("in", "out", "ckpt"))
    half = len(ds.stream) // 2
    rows1 = ds.stream[:half]
    write_stream_files(rows1, in_dir, files=1)

    def make_writer():
        return build_query(
            spark,
            clusters,
            ds.prefs,
            ds.attrs,
            ds.domains,
            input_dir=in_dir,
            output_dir=out_dir,
            checkpoint_dir=ckpt,
        )

    run_stream_to_completion(spark, make_writer())
    # Second half arrives later, with later timestamps (file named after).
    import json
    import os

    with open(os.path.join(in_dir, "batch-99999.json"), "w") as f:
        for t, (oid, vals) in enumerate(ds.stream[half:], start=half + 1):
            f.write(json.dumps({"obj_id": oid, "ts": t, "vals": list(vals)}) + "\n")
    run_stream_to_completion(spark, make_writer())
    assert _collect_pairs(spark, out_dir) == _driver_pairs(ds)
