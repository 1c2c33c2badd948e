"""Frontier-at-a-time path expansion — the shared engine of all four
enumerators (IDX-DFS, IDX-JOIN, BC-DFS, BC-JOIN).

One call expands a frontier of partial results from position
``start_pos`` to ``end_pos`` over an edge DataFrame.  A *partial result*
row is ``(path: array<long>, last: long [, acc, state])`` — the dataflow
image of the paper's ``M``.  Each loop iteration performs exactly one
recursion level of Algorithm 1/4:

* **index mode** (``pre=True``) — the per-step budget filter
  ``dt(dst) <= k - pos`` is pushed into the join against the pre-bucketed
  index edges, so only qualifying neighbours are ever touched: the
  dataflow analogue of the O(1) ``I_t(v,b)`` slice.
* **barrier mode** (``pre=False``) — the join runs against the coarser
  barrier-pruned edge set and the distance check happens *after*
  candidate materialisation, reproducing the baseline's higher per-step
  cost α (Appendix D).  ``accessed`` counts candidates before the check.

Rows reaching ``t`` are emitted and never extended (Definition 2.1 bans
interior s/t); the simple-path check is ``NOT array_contains(path,dst)``.
Each level materialises exactly one eagerly localCheckpoint-ed candidate
frame classified by a ``_cls`` column (emit / continue / pruned), so per
level there is one Spark job plus one tiny count — this keeps scheduler
latency bounded while still giving the per-depth counters the paper's
timeout, response-time and Figure-6/Table-7 metrics need.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.core.constraints import NO_CONSTRAINTS, Constraints

#: in-memory bytes per path cell (one vertex id) for Table-7 accounting.
CELL_BYTES = 8

_PRUNED, _EMIT, _CONTINUE = 0, 1, 2


@dataclass
class DepthStat:
    """Counters for one expansion level (extension to position ``pos``)."""

    pos: int
    accessed: int      # candidate edges touched (paper's "#Edges")
    emitted: int       # results completed at this level
    frontier: int      # surviving partial results
    elapsed_s: float


@dataclass
class ExpandStats:
    depth_stats: list[DepthStat] = field(default_factory=list)
    timed_out: bool = False
    row_capped: bool = False
    response_s: float | None = None   # time to first ``response_bar`` results
    elapsed_s: float = 0.0

    @property
    def total_accessed(self) -> int:
        return sum(d.accessed for d in self.depth_stats)

    @property
    def total_emitted(self) -> int:
        return sum(d.emitted for d in self.depth_stats)

    @property
    def max_frontier_cells(self) -> int:
        return max((d.frontier * (d.pos + 1) for d in self.depth_stats), default=0)


def make_frontier(
    spark: SparkSession,
    vertices: list[int],
    constraints: Constraints = NO_CONSTRAINTS,
) -> DataFrame:
    """Initial frontier: one single-vertex partial result per vertex."""
    df = spark.createDataFrame([(int(v),) for v in vertices], schema="last long").select(
        F.array(F.col("last")).alias("path"), "last"
    )
    return constraints.init_frontier(df)


def empty_results(spark: SparkSession, constraints: Constraints = NO_CONSTRAINTS) -> DataFrame:
    schema = "path array<long>"
    if constraints.accumulative:
        schema += ", acc double"
    if constraints.automaton:
        schema += ", state string"
    return spark.createDataFrame([], schema=schema)


def expand(
    spark: SparkSession,
    frontier: DataFrame,
    edges: DataFrame,
    *,
    t: int,
    k: int,
    start_pos: int,
    end_pos: int,
    budget_col: str | None,
    pre: bool = True,
    dedupe: bool = True,
    forbid: int | None = None,
    timeout_s: float | None = None,
    row_cap: int | None = None,
    response_bar: int | None = None,
    constraints: Constraints = NO_CONSTRAINTS,
) -> tuple[DataFrame, DataFrame, ExpandStats]:
    """Expand ``frontier`` (at ``start_pos``) through ``end_pos``.

    Returns ``(results, final_frontier, stats)``: ``results`` are paths
    that reached ``t`` (with constraint columns if any), ``final_frontier``
    the un-emitted partial results at ``end_pos`` (the join methods' R_a).
    ``timeout_s``/``row_cap`` convert runaway queries into a flagged
    partial answer, mirroring the paper's 120 s limit semantics.
    """
    t_lit = F.lit(int(t))
    stats = ExpandStats()
    t_start = time.perf_counter()
    acc_c = constraints.accumulative
    aut_c = constraints.automaton
    trans = aut_c.transition_df(spark) if aut_c else None

    results: list[DataFrame] = []
    cum_emitted = 0
    extra_cols = constraints.frontier_cols

    for pos in range(start_pos + 1, end_pos + 1):
        elapsed = time.perf_counter() - t_start
        if timeout_s is not None and elapsed > timeout_s:
            stats.timed_out = True
            break
        # Predictive termination: one depth is a single uninterruptible
        # Spark job, so a query that would blow the limit inside the next
        # join must be stopped *before* launching it — the dataflow
        # analogue of the paper's kill at the 120 s mark (results found so
        # far are reported).  Next-depth candidates ~ last candidates x
        # frontier growth; the per-row rate is taken from measurement only
        # when the last depth was large enough for row work to dominate
        # the ~0.5 s fixed job cost (otherwise an optimistic floor is
        # used, so small fast levels are never extrapolated into a kill).
        if timeout_s is not None and len(stats.depth_stats) >= 2:
            last, prev = stats.depth_stats[-1], stats.depth_stats[-2]
            growth = last.frontier / max(1, prev.frontier)
            predicted_rows = last.accessed * max(1.0, growth)
            rate = (
                last.elapsed_s / last.accessed
                if last.accessed > 1_000_000
                else 2e-7  # ~5M rows/s optimistic floor
            )
            if elapsed + 0.5 + predicted_rows * rate > timeout_s * 1.2:
                stats.timed_out = True
                break
        t_depth = time.perf_counter()
        budget = k - pos

        e = edges
        if pre and budget_col is not None:
            e = e.where(F.col(budget_col) <= budget)
        cand = frontier.join(e, frontier["last"] == e["src"], "inner")
        if aut_c:
            cand = cand.join(
                trans,
                (cand["state"] == trans["a_state"]) & (cand[aut_c.label_col] == trans["a_label"]),
                "inner",
            )

        # Step 1: new partial-result columns + raw flags from parent cols.
        flags = [
            (e["dst"] == t_lit).alias("_is_t"),
            (
                (F.col(budget_col) <= budget) if (not pre and budget_col is not None) else F.lit(True)
            ).alias("_valid"),
            (
                ~F.array_contains(cand["path"], e["dst"]) if dedupe else F.lit(True)
            ).alias("_fresh"),
            (
                (e["dst"] != F.lit(int(forbid))) if forbid is not None else F.lit(True)
            ).alias("_allowed"),
        ]
        proj = [
            F.concat(cand["path"], F.array(e["dst"])).alias("path"),
            e["dst"].alias("last"),
        ]
        if acc_c:
            proj.append((cand["acc"] + F.col(acc_c.weight_col)).alias("acc"))
        if aut_c:
            proj.append(trans["a_next"].alias("state"))
        cand = cand.select(*proj, *flags)

        # Step 2: classify (may reference the new acc/state columns).
        emit_ok = F.col("_is_t") & F.col("_valid")
        if acc_c:
            emit_ok = emit_ok & F.expr(acc_c.emit_pred)
        if aut_c:
            emit_ok = emit_ok & F.col("state").isin(list(aut_c.accepts))
        cont_ok = (
            ~F.col("_is_t") & F.col("_valid") & F.col("_fresh") & F.col("_allowed")
        )
        if acc_c and acc_c.prune_pred:
            cont_ok = cont_ok & F.expr(acc_c.prune_pred)
        cand = (
            cand.withColumn(
                "_cls",
                F.when(emit_ok, F.lit(_EMIT))
                .when(cont_ok, F.lit(_CONTINUE))
                .otherwise(F.lit(_PRUNED)),
            )
            .drop("_is_t", "_valid", "_fresh", "_allowed")
            .localCheckpoint(eager=True)
        )

        cnts = {r["_cls"]: r["count"] for r in cand.groupBy("_cls").count().collect()}
        accessed = sum(cnts.values())
        n_emit = cnts.get(_EMIT, 0)
        n_frontier = cnts.get(_CONTINUE, 0)

        if n_emit:
            results.append(
                cand.where(F.col("_cls") == _EMIT).select("path", *extra_cols)
            )
        cum_emitted += n_emit
        if (
            response_bar is not None
            and stats.response_s is None
            and cum_emitted >= response_bar
        ):
            stats.response_s = time.perf_counter() - t_start

        frontier = cand.where(F.col("_cls") == _CONTINUE).drop("_cls")
        stats.depth_stats.append(
            DepthStat(pos, accessed, n_emit, n_frontier, time.perf_counter() - t_depth)
        )
        if row_cap is not None and n_frontier > row_cap:
            stats.row_capped = True
            stats.timed_out = True
            break
        if n_frontier == 0:
            break

    stats.elapsed_s = time.perf_counter() - t_start
    if (
        response_bar is not None
        and stats.response_s is None
        and not stats.timed_out
    ):
        # fewer than ``bar`` results exist; first-bar time = completion time.
        stats.response_s = stats.elapsed_s

    if results:
        out = results[0]
        for r in results[1:]:
            out = out.unionByName(r)
    else:
        out = empty_results(spark, constraints)
    return out, frontier, stats
