"""End-to-end distributed pipeline (spark-submit entrypoint).

1. Generate the synthetic movie dataset (ratings + catalog + stream).
2. Derive every user's preference tuples with the Spark SQL pipeline
   (ratings ⋈ objects → stats → product-order pairs).
3. Compute pairwise user similarities distributively and run HAC; cut the
   dendrogram at --h to obtain the user clusters.
4. Build approximate common preference relations per cluster (Alg. 3).
5. Stream the object micro-batches through the Structured Streaming
   dissemination query (applyInPandasWithState per cluster partition).
6. Report dissemination counts and the efficacy vs the exact result.

Usage: spark-submit jobs/run_streaming_demo.py [--users N] [--stream N]
       (or plain `python jobs/run_streaming_demo.py`)
"""
import argparse
import shutil
import sys
import tempfile

from pyspark.sql import SparkSession


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--users", type=int, default=24)
    ap.add_argument("--groups", type=int, default=4)
    ap.add_argument("--stream", type=int, default=400)
    ap.add_argument("--h", type=float, default=0.6)
    ap.add_argument("--window", type=int, default=None)
    ap.add_argument("--batches", type=int, default=4)
    args = ap.parse_args(argv)

    spark = (
        SparkSession.builder.appName("repro-streaming-demo")
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    try:
        return run(spark, args)
    finally:
        spark.stop()


def run(spark, args) -> int:
    from repro.core.baseline import BaselineEngine
    from repro.core.hac import cluster_users
    from repro.core.metrics import efficacy
    from repro.dataflow.prefs_sql import (
        derive_prefs_spark,
        pairwise_jaccard_spark,
        prefs_to_spark_df,
    )
    from repro.dataflow.streaming import (
        build_query,
        read_disseminations,
        run_stream_to_completion,
        write_stream_files,
    )
    from repro.datasets import movie
    from repro.experiments.harness import clusters_for

    ds = movie.generate(
        n_users=args.users, n_groups=args.groups, n_stream=args.stream
    )
    prefs_df = derive_prefs_spark(
        spark,
        spark.createDataFrame(ds.ratings),
        spark.createDataFrame(ds.hist_objects),
        ds.attrs,
    ).cache()
    print(f"[demo] derived {prefs_df.count()} preference tuples on Spark")
    sims = pairwise_jaccard_spark(spark, prefs_to_spark_df(spark, ds.prefs), ds.attrs)
    dend = cluster_users(ds.attrs, ds.prefs, measure="jaccard", initial_sims=sims)
    clusters = clusters_for(ds, dend, args.h, approximate=True)
    print(f"[demo] h={args.h}: {len(clusters)} clusters, sizes "
          f"{[len(c.members) for c in clusters]}")

    workdir = tempfile.mkdtemp(prefix="repro-stream-")
    try:
        write_stream_files(ds.stream, f"{workdir}/in", files=args.batches)
        writer = build_query(
            spark,
            clusters,
            ds.prefs,
            ds.attrs,
            ds.domains,
            input_dir=f"{workdir}/in",
            output_dir=f"{workdir}/out",
            checkpoint_dir=f"{workdir}/ckpt",
            window=args.window,
            max_files_per_trigger=1,
        )
        run_stream_to_completion(spark, writer)
        got = read_disseminations(spark, f"{workdir}/out").toPandas()
    finally:
        shutil.rmtree(workdir, ignore_errors=True)

    approx_pairs = {(r.user_id, r.obj_id) for r in got.itertuples(index=False)}
    base = BaselineEngine(ds.attrs, ds.prefs, ds.domains)
    exact_pairs = set()
    for oid, vals in ds.stream:
        for c in base.insert(oid, vals):
            exact_pairs.add((c, oid))
    e = efficacy(approx_pairs, exact_pairs)
    print(
        f"[demo] disseminated {len(approx_pairs)} (user, object) pairs over "
        f"{args.stream} objects x {args.users} users; precision "
        f"{100 * e.precision:.2f}% recall {100 * e.recall:.2f}%"
    )
    return 0


if __name__ == "__main__":
    sys.exit(main())
