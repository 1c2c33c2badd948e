"""Bounded multi-source BFS as iterative DataFrame joins.

PathEnum's index needs four distance fields per query (Algorithm 3 plus
the barrier baseline):

* ``ds``  = S(s, v | G-{t})  — forward from s, never expanding through t
* ``dt``  = S(v, t | G-{s})  — reverse from t, never expanding through s
* ``dsf`` = S(s, v | G)      — forward from s (baseline barrier pruning)
* ``dtf`` = S(v, t | G)      — reverse from t (baseline barrier pruning)

All four run in ONE iterative loop: each BFS is a *tag*, the tagged edge
sets are unioned, and every iteration expands every tag's frontier with a
single join (Pregel-style, Catalyst-native — the PySpark stand-in for
GraphX).  "G-{x}" is realised as *reach-but-never-expand*: the excluded
vertex may receive a distance (t is the endpoint of every path, s the
start) but is filtered out of the frontier before each join, so no path
through its interior is counted.  Depth is bounded by the hop constraint
``k`` — distances larger than k are useless to the index and are never
computed.
"""
from __future__ import annotations

from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class BfsSpec:
    """One BFS instance: tag name, root vertex, optional non-expandable
    vertex, and direction (reverse walks the transposed graph)."""

    tag: str
    root: int
    excluded: int | None = None
    reverse: bool = False


def bounded_bfs(
    spark: SparkSession,
    edges: DataFrame,
    specs: list[BfsSpec],
    max_depth: int,
) -> DataFrame:
    """Run all ``specs`` simultaneously, bounded at ``max_depth`` hops.

    Returns a DataFrame ``(tag: string, v: long, dist: int)`` containing
    every vertex within ``max_depth`` of its tag's root (root included at
    dist 0).  Vertices not reached are simply absent.
    """
    tagged = None
    for sp in specs:
        e = edges.select(F.col("dst").alias("src"), F.col("src").alias("dst")) if sp.reverse else edges.select("src", "dst")
        e = e.withColumn("tag", F.lit(sp.tag))
        tagged = e if tagged is None else tagged.unionByName(e)
    tagged = tagged.persist()

    levels = [
        spark.createDataFrame(
            [(sp.tag, sp.root, 0) for sp in specs], schema="tag string, v long, dist int"
        ).localCheckpoint(eager=True)
    ]
    frontier = levels[0]
    blocked = [(sp.tag, sp.excluded) for sp in specs if sp.excluded is not None]
    blocked_df = (
        spark.createDataFrame(blocked, schema="tag string, v long") if blocked else None
    )

    for depth in range(1, max_depth + 1):
        f = frontier
        if blocked_df is not None:
            f = f.join(blocked_df, on=["tag", "v"], how="left_anti")
        visited = levels[0]
        for lvl in levels[1:]:
            visited = visited.unionByName(lvl)
        nxt = (
            f.join(tagged, on=[f.tag == tagged.tag, f.v == tagged.src], how="inner")
            .select(tagged.tag.alias("tag"), tagged.dst.alias("v"))
            .distinct()
            .join(visited, on=["tag", "v"], how="left_anti")
            .withColumn("dist", F.lit(depth))
            .localCheckpoint(eager=True)
        )
        if nxt.isEmpty():
            break
        levels.append(nxt)
        frontier = nxt

    tagged.unpersist()
    out = levels[0]
    for lvl in levels[1:]:
        out = out.unionByName(lvl)
    return out


def distance_table(
    spark: SparkSession,
    edges: DataFrame,
    s: int,
    t: int,
    k: int,
) -> DataFrame:
    """Per-vertex distance table ``(v, ds, dt, dsf, dtf)`` for q(s,t,k).

    Missing distances (unreachable within k hops) are NULL; downstream
    index filters treat NULL as "outside the index", which is exactly the
    paper's pruning semantics.
    """
    specs = [
        BfsSpec("ds", s, excluded=t, reverse=False),
        BfsSpec("dt", t, excluded=s, reverse=True),
        BfsSpec("dsf", s, excluded=None, reverse=False),
        BfsSpec("dtf", t, excluded=None, reverse=True),
    ]
    raw = bounded_bfs(spark, edges, specs, k)
    return (
        raw.groupBy("v")
        .pivot("tag", ["ds", "dt", "dsf", "dtf"])
        .agg(F.first("dist"))
    )
