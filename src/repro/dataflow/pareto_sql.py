"""Batch Pareto frontier as one SQL text for both Spark and DuckDB.

For one preference profile (a user or a cluster's virtual user), given

* ``objects(obj_id, <attr columns>)`` and
* ``prefs(attr, better, worse)`` — the profile's transitively closed
  preference tuples,

the dominance condition of Def. 2 becomes a self-join: ``b`` dominates
``w`` iff on every attribute ``b``'s value equals ``w``'s or the pair is
in ``prefs``, with strict preference on at least one attribute. The
frontier is the anti-join against the dominated set. Quadratic in the
number of objects — this is the *batch* (re)computation path used for
oracle checks and bootstrap, not the incremental engines.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.posets.poset import Poset


def pareto_frontier_sql(
    attrs: Sequence[str], objects: str = "objects", prefs: str = "prefs"
) -> str:
    geq = [
        f"(b.{d} = w.{d} OR p_{d}.better IS NOT NULL)" for d in attrs
    ]
    strict = [
        f"(b.{d} <> w.{d} AND p_{d}.better IS NOT NULL)" for d in attrs
    ]
    joins = "\n      ".join(
        f"LEFT JOIN {prefs} p_{d} ON p_{d}.attr = '{d}' "
        f"AND p_{d}.better = b.{d} AND p_{d}.worse = w.{d}"
        for d in attrs
    )
    return f"""
    WITH dom AS (
      SELECT DISTINCT w.obj_id AS obj_id
      FROM {objects} b
      JOIN {objects} w ON b.obj_id <> w.obj_id
      {joins}
      WHERE {" AND ".join(geq)}
        AND ({" OR ".join(strict)})
    )
    SELECT o.obj_id AS obj_id
    FROM {objects} o
    WHERE o.obj_id NOT IN (SELECT obj_id FROM dom)
    """


def profile_prefs_df(prefs_by_attr: dict[str, Poset]) -> pd.DataFrame:
    """One profile's relations → the (attr, better, worse) table."""
    rows = [
        (d, str(x), str(y))
        for d, poset in prefs_by_attr.items()
        for (x, y) in sorted(poset.pairs, key=repr)
    ]
    return pd.DataFrame(rows, columns=["attr", "better", "worse"])


def pareto_frontier_spark(
    spark: SparkSession,
    objects: DataFrame,
    prefs_by_attr: dict[str, Poset],
    attrs: Sequence[str],
) -> DataFrame:
    """Run the frontier SQL on Spark; returns a one-column obj_id frame."""
    objects.createOrReplaceTempView("objects")
    pdf = profile_prefs_df(prefs_by_attr)
    if pdf.empty:
        # createDataFrame cannot infer a schema from an empty frame.
        spark.createDataFrame(
            [], "attr string, better string, worse string"
        ).createOrReplaceTempView("prefs")
    else:
        spark.createDataFrame(pdf).createOrReplaceTempView("prefs")
    return spark.sql(pareto_frontier_sql(attrs))
