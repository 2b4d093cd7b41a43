"""Benchmark: the Catalyst batch Pareto frontier (dominance self-join +
anti-join) — the paper's "recompute from scratch" comparator that the
incremental engines avoid."""
import pandas as pd
import pytest

from repro.core.dominance import Profile, brute_force_frontier
from repro.dataflow.pareto_sql import pareto_frontier_spark
from repro.datasets import movie

N_OBJECTS = 600


@pytest.fixture(scope="module")
def ds():
    return movie.generate(n_users=4, n_groups=2, n_stream=N_OBJECTS)


def test_pareto_frontier_catalyst(benchmark, spark, ds):
    rows = [
        {"obj_id": oid, **dict(zip(ds.attrs, v))} for oid, v in ds.stream
    ]
    objects_df = spark.createDataFrame(pd.DataFrame(rows))
    objects_df.cache().count()
    u = ds.users[0]

    def run():
        return {
            r.obj_id
            for r in pareto_frontier_spark(
                spark, objects_df, ds.prefs[u], ds.attrs
            ).collect()
        }

    got = benchmark.pedantic(run, rounds=1, iterations=1)
    expect = brute_force_frontier(
        Profile(ds.attrs, ds.prefs[u], ds.domains), dict(ds.stream)
    )
    assert got == expect
