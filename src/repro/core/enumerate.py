"""Index-based enumeration: IDX-DFS (Algorithm 4) and IDX-JOIN (Algorithm 6).

Both run on the light-weight index edges of a :class:`QueryContext`.

* ``idx_dfs`` is the left-deep plan: one expansion from s to t, budgets
  pushed into every join (paper cost ``T_DFS = sum_i |Q[0:i]|``).
* ``idx_join`` is the bushy plan: expand prefix Q[0:cut] and suffix
  Q[cut:k] separately, hash-join on the cut vertex, and filter non-simple
  tuples (paper cost ``T_JOIN = |Q| + T(Q[0:cut]) + T(Q[cut:k])``).
  Results shorter than the cut surface directly from the prefix phase
  (they correspond to ``(t,t)``-padded tuples in the join model).

The shared machinery is parameterised over the edge set and budget mode
so the BC-* baselines (``repro.core.baselines``) reuse it verbatim.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.core.constraints import NO_CONSTRAINTS, Constraints
from repro.core.context import QueryContext
from repro.core.expand import CELL_BYTES, ExpandStats, empty_results, expand, make_frontier


@dataclass
class EnumResult:
    """Outcome of one enumeration run, with the paper's per-query metrics."""

    method: str
    paths: DataFrame              # (path array<long> [, acc, state])
    n_results: int
    enum_s: float                 # enumeration wall time
    timed_out: bool
    response_s: float | None      # time to first `response_bar` results
    edges_accessed: int           # Figure-6 "#Edges" metric
    partial_cells: int            # peak materialised partial-result cells
    detail: dict = field(default_factory=dict)

    @property
    def partial_mb(self) -> float:
        return self.partial_cells * CELL_BYTES / 2**20


def paths_to_strings(paths: DataFrame) -> DataFrame:
    """One ``path`` string column ('-'-joined ids) for the DuckDB oracle."""
    return paths.select(F.array_join(F.col("path"), "-").alias("path"))


def idx_dfs(
    ctx: QueryContext,
    *,
    timeout_s: float | None = None,
    row_cap: int | None = None,
    response_bar: int | None = None,
    constraints: Constraints = NO_CONSTRAINTS,
) -> EnumResult:
    """Algorithm 4: depth-first (left-deep) search on the index."""
    return _dfs(
        ctx,
        ctx.index_edges,
        budget_col="dt_dst",
        pre=True,
        method="IDX-DFS",
        timeout_s=timeout_s,
        row_cap=row_cap,
        response_bar=response_bar,
        constraints=constraints,
    )


def _dfs(
    ctx: QueryContext,
    edges: DataFrame,
    *,
    budget_col: str,
    pre: bool,
    method: str,
    timeout_s: float | None,
    row_cap: int | None,
    response_bar: int | None,
    constraints: Constraints = NO_CONSTRAINTS,
) -> EnumResult:
    t0 = time.perf_counter()
    frontier = make_frontier(ctx.spark, [ctx.s], constraints)
    results, _, stats = expand(
        ctx.spark,
        frontier,
        edges,
        t=ctx.t,
        k=ctx.k,
        start_pos=0,
        end_pos=ctx.k,
        budget_col=budget_col,
        pre=pre,
        timeout_s=timeout_s,
        row_cap=row_cap,
        response_bar=response_bar,
        constraints=constraints,
    )
    n = stats.total_emitted
    return EnumResult(
        method=method,
        paths=results,
        n_results=n,
        enum_s=time.perf_counter() - t0,
        timed_out=stats.timed_out,
        response_s=stats.response_s,
        edges_accessed=stats.total_accessed,
        partial_cells=stats.max_frontier_cells,
        detail={"stats": stats},
    )


def idx_join(
    ctx: QueryContext,
    cut: int,
    *,
    timeout_s: float | None = None,
    row_cap: int | None = None,
    constraints: Constraints = NO_CONSTRAINTS,
) -> EnumResult:
    """Algorithm 6: evaluate Q[0:cut] and Q[cut:k] then hash-join."""
    return _join_enum(
        ctx,
        ctx.index_edges,
        cut,
        budget_col="dt_dst",
        pre=True,
        method="IDX-JOIN",
        timeout_s=timeout_s,
        row_cap=row_cap,
        constraints=constraints,
    )


def _join_enum(
    ctx: QueryContext,
    edges: DataFrame,
    cut: int,
    *,
    budget_col: str,
    pre: bool,
    method: str,
    timeout_s: float | None,
    row_cap: int | None,
    constraints: Constraints = NO_CONSTRAINTS,
) -> EnumResult:
    if constraints.automaton is not None:
        raise ValueError(
            "join-based enumeration does not support automaton constraints; "
            "use the DFS method (paper Appendix E: the DFS terminates "
            "invalid label sequences earlier)"
        )
    spark, s, t, k = ctx.spark, ctx.s, ctx.t, ctx.k
    t0 = time.perf_counter()
    if k < 2:
        cut = 0
    cut = max(0, min(cut, k - 1))
    acc_c = constraints.accumulative

    # Phase 1: prefix Q[0:cut] — paths of length <= cut surface as results.
    frontier = make_frontier(spark, [s], constraints)
    early, ra, st_a = expand(
        spark,
        frontier,
        edges,
        t=t,
        k=k,
        start_pos=0,
        end_pos=cut,
        budget_col=budget_col,
        pre=pre,
        timeout_s=timeout_s,
        row_cap=row_cap,
        constraints=constraints,
    )
    ra = ra.localCheckpoint(eager=True)
    n_ra = ra.count()
    n_early = st_a.total_emitted
    if st_a.timed_out or n_ra == 0:
        enum_s = time.perf_counter() - t0
        return EnumResult(
            method=method,
            paths=early,
            n_results=n_early,
            enum_s=enum_s,
            timed_out=st_a.timed_out,
            response_s=None if st_a.timed_out else enum_s,
            edges_accessed=st_a.total_accessed,
            partial_cells=st_a.max_frontier_cells,
            detail={"cut": cut, "stats_a": st_a, "n_ra": n_ra},
        )

    # Phase 2: suffix Q[cut:k] from each distinct cut vertex (Alg 6 line 3-5).
    cut_vs = ra.select(F.col("last")).distinct()
    sfx_frontier = cut_vs.select(F.array(F.col("last")).alias("path"), F.col("last"))
    if acc_c:
        sfx_frontier = sfx_frontier.withColumn("acc", F.lit(0.0))
    remaining = None if timeout_s is None else max(0.1, timeout_s - (time.perf_counter() - t0))
    sfx, _, st_b = expand(
        spark,
        sfx_frontier,
        edges,
        t=t,
        k=k,
        start_pos=cut,
        end_pos=k,
        budget_col=budget_col,
        pre=pre,
        forbid=s,
        timeout_s=remaining,
        row_cap=row_cap,
        # suffix-local accumulative state: emit-filter only after the join,
        # on the combined value — so no emit/prune predicates here.
        constraints=Constraints(accumulative=None) if acc_c is None else Constraints(
            accumulative=type(acc_c)(
                emit_pred="acc IS NOT NULL", weight_col=acc_c.weight_col, init=0.0
            )
        ),
    )
    sfx = sfx.localCheckpoint(eager=True)
    n_rb = sfx.count()

    # Guard: the final join is a single uninterruptible Spark job, so we
    # refuse to launch it when the time budget is spent or the crude
    # per-key product estimate exceeds the cap — the dataflow analogue of
    # the paper's 120 s termination (and its BC-JOIN OOM at ep/k=8).
    n_keys = max(1, ra.select("last").distinct().count())
    est_out = n_ra * n_rb / n_keys
    out_of_time = timeout_s is not None and time.perf_counter() - t0 > timeout_s
    if st_b.timed_out or out_of_time or (row_cap is not None and est_out > 20 * row_cap):
        enum_s = time.perf_counter() - t0
        return EnumResult(
            method=method,
            paths=early,
            n_results=n_early,
            enum_s=enum_s,
            timed_out=True,
            response_s=None,
            edges_accessed=st_a.total_accessed + st_b.total_accessed,
            partial_cells=n_ra * (cut + 1) + n_rb * (k - cut + 1),
            detail={"cut": cut, "n_ra": n_ra, "n_rb": n_rb, "join_skipped": True,
                    "stats_a": st_a, "stats_b": st_b},
        )

    # Phase 3: hash join on the cut vertex + simple-path filter (Alg 6 l.6-8).
    pre_cols = [ra["path"].alias("a_path"), ra["last"].alias("a_last")]
    if acc_c:
        pre_cols.append(ra["acc"].alias("a_acc"))
    a = ra.select(*pre_cols)
    sfx_cols = [
        sfx["path"].alias("b_path"),
        F.element_at(sfx["path"], 1).alias("b_first"),
    ]
    if acc_c:
        sfx_cols.append(sfx["acc"].alias("b_acc"))
    b = sfx.select(*sfx_cols)
    tail = F.slice(F.col("b_path"), 2, F.size(F.col("b_path")) - 1)
    joined = (
        a.join(b, F.col("a_last") == F.col("b_first"), "inner")
        .where(~F.arrays_overlap(F.col("a_path"), tail))
        .select(
            F.concat(F.col("a_path"), tail).alias("path"),
            *([(F.col("a_acc") + F.col("b_acc")).alias("acc")] if acc_c else []),
        )
    )
    if acc_c:
        joined = joined.where(acc_c.emit_pred)
    joined = joined.localCheckpoint(eager=True)
    n_joined = joined.count()

    paths = early.unionByName(joined) if n_early else joined
    if n_early and not n_joined:
        paths = early
    enum_s = time.perf_counter() - t0
    timed_out = st_a.timed_out or st_b.timed_out
    partial_cells = (
        n_ra * (cut + 1)
        + n_rb * (k - cut + 1)
        + max(st_a.max_frontier_cells, st_b.max_frontier_cells)
    )
    return EnumResult(
        method=method,
        paths=paths,
        n_results=n_early + n_joined,
        enum_s=enum_s,
        timed_out=timed_out,
        # join methods have no early results: first-X time = total time.
        response_s=None if timed_out else enum_s,
        edges_accessed=st_a.total_accessed + st_b.total_accessed,
        partial_cells=partial_cells,
        detail={
            "cut": cut,
            "n_ra": n_ra,
            "n_rb": n_rb,
            "n_joined": n_joined,
            "stats_a": st_a,
            "stats_b": st_b,
        },
    )
