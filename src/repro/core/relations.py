"""The join-based model of HcPE (paper §3.1, Theorem 3.1, Algorithm 2).

A query q(s,t,k) becomes a chain join Q = R_1 ⋈ … ⋈ R_k over binary
relations built from the edge list:

* ``R_1`` — edges out of s;
* ``R_i`` (1<i<k) — edges of G-{s} with src != t, plus the padding tuple
  ``(t,t)``;
* ``R_k`` — edges into t with src != s, plus ``(t,t)``.

The ``(t,t)`` self-loop pads walks shorter than k to exactly k positions,
so a single k-way join covers all lengths <= k; tuples whose prefix up to
the first t has a duplicate vertex are filtered afterwards (Theorem 3.1).

:func:`full_reducer` is the classical dangling-tuple elimination
(Algorithm 2): a forward then a backward semi-join sweep.  This module is
the reference substrate the light-weight index is compared against
(Appendix B's pruning-power claim); the production path enumerates on the
index instead.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def build_relations(edges: DataFrame, s: int, t: int, k: int) -> list[DataFrame]:
    """R_1..R_k per §3.1 (list index 0 is R_1); columns ``src``/``dst``."""
    if k < 1:
        raise ValueError("k must be >= 1")
    pad = edges.sparkSession.createDataFrame([(t, t)], schema="src long, dst long")
    rels: list[DataFrame] = [edges.where(F.col("src") == s).select("src", "dst")]
    mid = edges.where(
        (F.col("src") != s) & (F.col("dst") != s) & (F.col("src") != t)
    ).select("src", "dst")
    for _ in range(2, k):
        rels.append(mid.unionByName(pad))
    if k >= 2:
        last = edges.where((F.col("dst") == t) & (F.col("src") != s)).select("src", "dst")
        rels.append(last.unionByName(pad))
    return rels


def full_reducer(rels: list[DataFrame]) -> list[DataFrame]:
    """Algorithm 2 lines 5-12: drop dangling tuples with two semi-join
    sweeps.  After this, every remaining tuple joins into some result of Q
    (Proposition 4.2)."""
    rels = list(rels)
    for i in range(len(rels) - 1):  # forward: R_{i+1}.src must appear in R_i.dst
        keys = rels[i].select(F.col("dst").alias("src")).distinct()
        rels[i + 1] = rels[i + 1].join(keys, "src", "left_semi")
    for i in range(len(rels) - 2, -1, -1):  # backward: R_i.dst in R_{i+1}.src
        keys = rels[i + 1].select(F.col("src").alias("dst")).distinct()
        rels[i] = rels[i].join(keys, "dst", "left_semi")
    return rels


def chain_join(rels: list[DataFrame]) -> DataFrame:
    """Evaluate Q left-deep; returns one ``tuple`` array column u_0..u_k."""
    k = len(rels)
    acc = rels[0].select(
        F.array(F.col("src"), F.col("dst")).alias("tuple"), F.col("dst").alias("last")
    )
    for i in range(1, k):
        r = rels[i].select(F.col("src").alias("last"), F.col("dst"))
        acc = (
            acc.join(r, "last")
            .select(
                F.concat(F.col("tuple"), F.array(F.col("dst"))).alias("tuple"),
                F.col("dst").alias("last"),
            )
        )
    return acc.select("tuple")


def tuples_to_paths(q: DataFrame, t: int) -> DataFrame:
    """Theorem 3.1 post-filter, returning a ``path`` string column.

    A tuple is a valid path iff everything after the first ``t`` is
    padding and the prefix up to the first ``t`` is duplicate-free; the
    path is that prefix.
    """
    t_lit = F.lit(t)
    first_t = F.array_position(F.col("tuple"), t_lit)  # 1-based; 0 if absent
    path = F.slice(F.col("tuple"), 1, first_t)
    tail = F.slice(
        F.col("tuple"), first_t + 1, F.size(F.col("tuple")) - first_t
    )
    return (
        q.where(first_t > 0)
        .where(F.size(F.filter(tail, lambda x: x != t_lit)) == 0)
        .withColumn("p", path)
        .where(F.size(F.array_distinct(F.col("p"))) == F.size(F.col("p")))
        .select(F.array_join(F.col("p"), "-").alias("path"))
        .distinct()
    )


def enumerate_via_chain_join(
    edges: DataFrame, s: int, t: int, k: int, *, reduce: bool = True
) -> DataFrame:
    """End-to-end §3.1 pipeline: relations -> (full reducer) -> chain join
    -> Theorem 3.1 filter.  Reference implementation; O(k x |E|) joins on
    the raw relations, used for correctness tests and model validation."""
    rels = build_relations(edges, s, t, k)
    if reduce:
        rels = full_reducer(rels)
    return tuples_to_paths(chain_join(rels), t)
