"""Cardinality estimation and join-order optimisation (paper §6, Alg. 5).

Two estimators with different cost/accuracy trade-offs:

* :func:`preliminary_estimate` (Eq. 5) — per-position average branching
  factors ``gamma_j`` over the index, multiplied out on the driver.  Two
  small aggregation jobs; used to gate the expensive path.
* :func:`full_estimate` (Eq. 6/7, Algorithm 5) — exact *walk*-count
  dynamic programming on the index: forward counts ``f_i(v)`` (walks
  s->v arriving at position i) and backward counts ``w_i(v)`` (walks
  v->t within budget k-i).  From these: per-cut sizes ``A[i]=|Q[0:i]|``
  and ``B[i]=|Q[i:k]|``, the optimal cut ``i* = argmin(A[i]+B[i])`` and
  the plan costs ``T_DFS`` / ``T_JOIN`` of the Eq. 1 cost model.

Counts follow the (t,t)-padded join model: a walk that reaches t early
keeps counting as a padded tuple, which equals exactly what the join
method materialises (early results + R_a) — see DESIGN.md §2.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pyspark.sql.functions as F

from repro.core.context import QueryContext


def preliminary_estimate(ctx: QueryContext) -> float:
    """Eq. 5: rough search-space size from per-position branching stats.

    gamma_j = (1/|C_j|) * sum_{v in C_j} |I_t(v, k-j-1)|;
    T_hat   = sum_{i<k} prod_{j<=i} gamma_j.
    Stats are cached on the context (the paper collects them while
    building the index).
    """
    k = ctx.k
    if not ctx.gamma:
        spark = ctx.spark
        pos = spark.range(0, k).select(F.col("id").cast("int").alias("j"))
        cnt = (
            ctx.index_edges.crossJoin(pos)
            .where(
                (F.col("ds_src") <= F.col("j"))
                & (F.col("dt_src") <= k - F.col("j"))
                & (F.col("dt_dst") <= k - F.col("j") - 1)
            )
            .groupBy("j")
            .count()
        )
        size = (
            ctx.dist.crossJoin(pos)
            .where((F.col("ds") <= F.col("j")) & (F.col("dt") <= k - F.col("j")))
            .groupBy("j")
            .count()
        )
        cnt_m = {r["j"]: r["count"] for r in cnt.collect()}
        size_m = {r["j"]: r["count"] for r in size.collect()}
        ctx.gamma = [
            (cnt_m.get(j, 0) / size_m[j]) if size_m.get(j) else 0.0 for j in range(k)
        ]
    t_hat, prod = 0.0, 1.0
    for g in ctx.gamma:
        prod *= g
        t_hat += prod
    return t_hat


@dataclass
class FullEstimate:
    """Outcome of Algorithm 5 over the index."""

    a: list[float]        # A[i] = |Q[0:i]|, i = 0..k (padded prefix counts)
    b: list[float]        # B[i] = |Q[i:k]|, i = 0..k (suffix walk counts)
    ended: list[float]    # walks s->t finishing exactly at position i
    walks: float          # |Q| = total walks within k
    i_star: int           # argmin_i (A[i] + B[i])
    t_dfs: float          # Eq. 1 cost of the left-deep plan
    t_join: float         # Eq. 1 cost of the bushy plan cut at i_star
    opt_s: float          # wall time of the optimisation


def full_estimate(ctx: QueryContext) -> FullEstimate:
    """Run the forward/backward walk-count DP and pick the cut position."""
    t0 = time.perf_counter()
    spark, s, t, k = ctx.spark, ctx.s, ctx.t, ctx.k
    idx = ctx.index_edges

    # Backward: w_i(v) = #walks v->t of length <= k-i through the index.
    w = spark.createDataFrame([(t, 1.0)], schema="v long, c double")
    b_sums: list[float] = [0.0] * (k + 1)
    ds_of = ctx.dist.select("v", "ds")
    for i in range(k, -1, -1):
        if i < k:
            contrib = (
                idx.where(F.col("dt_dst") <= k - i - 1)
                .join(w.withColumnRenamed("v", "dst"), "dst")
                .groupBy(F.col("src").alias("v"))
                .agg(F.sum("c").alias("c"))
            )
            w = contrib.unionByName(
                spark.createDataFrame([(t, 1.0)], schema="v long, c double")
            ).localCheckpoint(eager=True)
        row = (
            w.join(ds_of, "v").where(F.col("ds") <= i).agg(F.sum("c").alias("b")).collect()[0]
        )
        b_sums[i] = float(row["b"] or 0.0)

    # Forward: f_i(v) = #walks s->v arriving exactly at position i (t stops).
    f = spark.createDataFrame([(s, 1.0)], schema="v long, c double")
    ended: list[float] = [0.0] * (k + 1)
    a_sums: list[float] = [0.0] * (k + 1)
    a_sums[0] = 1.0  # Q[0:0] is the single tuple (s)
    cum_ended = 0.0
    for i in range(1, k + 1):
        f = (
            idx.where(F.col("dt_dst") <= k - i)
            .join(f.withColumnRenamed("v", "src"), "src")
            .groupBy(F.col("dst").alias("v"))
            .agg(F.sum("c").alias("c"))
            .localCheckpoint(eager=True)
        )
        row = f.agg(
            F.sum("c").alias("total"),
            F.sum(F.when(F.col("v") == t, F.col("c"))).alias("at_t"),
        ).collect()[0]
        total = float(row["total"] or 0.0)
        ended[i] = float(row["at_t"] or 0.0)
        cum_ended += ended[i]
        a_sums[i] = (total - ended[i]) + cum_ended
        f = f.where(F.col("v") != t)

    walks = cum_ended
    i_star = min(range(k + 1), key=lambda i: a_sums[i] + b_sums[i])
    t_dfs = sum(a_sums[1:])
    t_join = walks + sum(a_sums[1 : i_star + 1]) + sum(b_sums[i_star:])
    return FullEstimate(
        a=a_sums,
        b=b_sums,
        ended=ended,
        walks=walks,
        i_star=i_star,
        t_dfs=t_dfs,
        t_join=t_join,
        opt_s=time.perf_counter() - t0,
    )
