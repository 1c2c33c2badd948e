"""Appendix-E extensions: edge predicates, accumulative values (Alg. 7),
action-sequence automata (Alg. 8) — each checked against an independent
oracle (DuckDB CTE with weights, or the Python reference DFS)."""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
import pytest

from repro import pathoracle as po
from repro.core.baselines import bc_dfs
from repro.core.constraints import (
    AccumulativeConstraint,
    AutomatonConstraint,
    Constraints,
    apply_edge_predicate,
)
from repro.core.context import build_context
from repro.core.enumerate import idx_dfs, idx_join, paths_to_strings
from repro.oracle import assert_equivalent
from tests.helpers import PAPER_EDGES, edges_pdf

# deterministic weights/labels per edge
def _wl(u: int, v: int) -> tuple[float, str]:
    return float((u * 7 + v * 3) % 5) / 2.0, "ab"[(u + v) % 2]


WEIGHTS = {(u, v): _wl(u, v)[0] for u, v in PAPER_EDGES}
LABELS = {(u, v): _wl(u, v)[1] for u, v in PAPER_EDGES}


def rich_edges_pdf() -> pd.DataFrame:
    rows = [(u, v, WEIGHTS[(u, v)], LABELS[(u, v)]) for u, v in PAPER_EDGES]
    return pd.DataFrame(rows, columns=["src", "dst", "weight", "label"]).astype(
        {"src": "int64", "dst": "int64"}
    )


@pytest.fixture(scope="module")
def rich_ctx(spark):
    ctx = build_context(spark, spark.createDataFrame(rich_edges_pdf()), 0, 1, 4)
    yield ctx
    ctx.unpersist()


# --------------------------------------------------------- edge predicate
def test_edge_predicate_filters_before_index(spark):
    e = spark.createDataFrame(rich_edges_pdf())
    filtered = apply_edge_predicate(e, "weight < 2.0")
    ctx = build_context(spark, filtered, 0, 1, 4)
    res = idx_dfs(ctx)
    kept = [uv for uv in PAPER_EDGES if WEIGHTS[uv] < 2.0]
    want = po.python_paths(kept, 0, 1, 4)
    got = {po.path_str(r["path"]) for r in res.paths.collect()}
    assert got == want
    ctx.unpersist()


def test_edge_predicate_via_oracle(spark):
    e = spark.createDataFrame(rich_edges_pdf())
    ctx = build_context(spark, apply_edge_predicate(e, "weight < 2.0"), 0, 1, 4)
    res = idx_dfs(ctx)
    kept = rich_edges_pdf().query("weight < 2.0")[["src", "dst"]]
    assert_equivalent(
        paths_to_strings(res.paths), po.duckdb_path_sql(0, 1, 4), edges=kept
    )
    ctx.unpersist()


# ----------------------------------------------------- accumulative value
@pytest.mark.parametrize("thresh", [0.0, 2.0, 4.5])
def test_accumulative_dfs_matches_python(rich_ctx, thresh):
    c = Constraints(accumulative=AccumulativeConstraint(emit_pred=f"acc >= {thresh}"))
    res = idx_dfs(rich_ctx, constraints=c)
    want = po.python_paths(
        PAPER_EDGES, 0, 1, 4, weights=WEIGHTS, acc_pred=lambda a: a >= thresh
    )
    got = {po.path_str(r["path"]) for r in res.paths.collect()}
    assert got == want


def test_accumulative_dfs_matches_duckdb(rich_ctx):
    c = Constraints(accumulative=AccumulativeConstraint(emit_pred="acc >= 3.0"))
    res = idx_dfs(rich_ctx, constraints=c)
    sql = po.duckdb_path_sql(0, 1, 4, weight_filter="acc >= 3.0")
    assert_equivalent(paths_to_strings(res.paths), sql, edges=rich_edges_pdf())


def test_accumulative_acc_values_correct(rich_ctx):
    c = Constraints(accumulative=AccumulativeConstraint(emit_pred="acc >= 0"))
    res = idx_dfs(rich_ctx, constraints=c)
    for r in res.paths.collect():
        p = list(r["path"])
        want = sum(WEIGHTS[(u, v)] for u, v in zip(p, p[1:]))
        assert r["acc"] == pytest.approx(want)


@pytest.mark.parametrize("cut", [1, 2, 3])
def test_accumulative_join_matches_dfs(rich_ctx, cut):
    """⊕ is associative/commutative, so the join method may split the
    accumulation at the cut (Appendix E)."""
    c = Constraints(accumulative=AccumulativeConstraint(emit_pred="acc >= 3.0"))
    res_j = idx_join(rich_ctx, cut, constraints=c)
    want = po.python_paths(
        PAPER_EDGES, 0, 1, 4, weights=WEIGHTS, acc_pred=lambda a: a >= 3.0
    )
    got = {po.path_str(r["path"]) for r in res_j.paths.collect()}
    assert got == want


def test_accumulative_monotone_prune(rich_ctx):
    """With nonnegative weights and a <=-threshold, pruning mid-search is
    sound (Alg. 7 discussion) and must not change the answer."""
    base = AccumulativeConstraint(emit_pred="acc <= 3.0")
    pruned = AccumulativeConstraint(emit_pred="acc <= 3.0", prune_pred="acc <= 3.0")
    a = idx_dfs(rich_ctx, constraints=Constraints(accumulative=base))
    b = idx_dfs(rich_ctx, constraints=Constraints(accumulative=pruned))
    sa = {po.path_str(r["path"]) for r in a.paths.collect()}
    sb = {po.path_str(r["path"]) for r in b.paths.collect()}
    assert sa == sb
    assert b.edges_accessed <= a.edges_accessed


def test_accumulative_on_baseline(rich_ctx):
    c = Constraints(accumulative=AccumulativeConstraint(emit_pred="acc >= 3.0"))
    res = bc_dfs(rich_ctx, constraints=c)
    want = po.python_paths(
        PAPER_EDGES, 0, 1, 4, weights=WEIGHTS, acc_pred=lambda a: a >= 3.0
    )
    assert {po.path_str(r["path"]) for r in res.paths.collect()} == want


# ------------------------------------------------------------- automaton
AB_AUTOMATON = AutomatonConstraint(
    start="q0",
    transitions=(("q0", "a", "q1"), ("q1", "b", "q0"), ("q1", "a", "q1")),
    accepts=frozenset({"q1"}),
)


def _py_automaton():
    return (
        AB_AUTOMATON.start,
        {(a, l): n for a, l, n in AB_AUTOMATON.transitions},
        set(AB_AUTOMATON.accepts),
    )


def test_automaton_dfs_matches_python(rich_ctx):
    res = idx_dfs(rich_ctx, constraints=Constraints(automaton=AB_AUTOMATON))
    want = po.python_paths(
        PAPER_EDGES, 0, 1, 4, labels=LABELS, automaton=_py_automaton()
    )
    got = {po.path_str(r["path"]) for r in res.paths.collect()}
    assert got == want


def test_automaton_dfs_via_registered_expected(rich_ctx):
    """Route the automaton check through assert_equivalent by registering
    the Python-reference answer as a DuckDB table."""
    res = idx_dfs(rich_ctx, constraints=Constraints(automaton=AB_AUTOMATON))
    want = sorted(
        po.python_paths(PAPER_EDGES, 0, 1, 4, labels=LABELS, automaton=_py_automaton())
    )
    expected = pd.DataFrame({"path": want})
    assert_equivalent(
        paths_to_strings(res.paths), "SELECT path FROM expected", expected=expected
    )


def test_automaton_states_are_valid(rich_ctx):
    res = idx_dfs(rich_ctx, constraints=Constraints(automaton=AB_AUTOMATON))
    for r in res.paths.collect():
        assert r["state"] in AB_AUTOMATON.accepts


def test_automaton_rejects_join(rich_ctx):
    with pytest.raises(ValueError):
        idx_join(rich_ctx, 2, constraints=Constraints(automaton=AB_AUTOMATON))


def test_dead_automaton_empty(rich_ctx):
    aut = AutomatonConstraint(start="q0", transitions=(), accepts=frozenset({"q9"}))
    res = idx_dfs(rich_ctx, constraints=Constraints(automaton=aut))
    assert res.n_results == 0


def test_combined_acc_and_automaton(rich_ctx):
    c = Constraints(
        accumulative=AccumulativeConstraint(emit_pred="acc >= 2.0"),
        automaton=AB_AUTOMATON,
    )
    res = idx_dfs(rich_ctx, constraints=c)
    want = po.python_paths(
        PAPER_EDGES,
        0,
        1,
        4,
        weights=WEIGHTS,
        acc_pred=lambda a: a >= 2.0,
        labels=LABELS,
        automaton=_py_automaton(),
    )
    assert {po.path_str(r["path"]) for r in res.paths.collect()} == want
