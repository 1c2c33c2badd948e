"""Distributed bounded BFS vs. the pure-Python reference."""
from __future__ import annotations

import pytest

from repro.graphs.bfs import BfsSpec, bounded_bfs, distance_table
from tests.helpers import CYCLE6, LINE, PAPER_EDGES, edges_df, py_bfs, random_graph


def _spark_dists(spark, edges, spec: BfsSpec, depth: int) -> dict[int, int]:
    out = bounded_bfs(spark, edges_df(spark, edges), [spec], depth)
    return {r["v"]: r["dist"] for r in out.collect()}


def test_line_forward(spark):
    d = _spark_dists(spark, LINE, BfsSpec("x", 0), 10)
    assert d == {0: 0, 1: 1, 2: 2, 3: 3, 4: 4}


def test_line_reverse(spark):
    d = _spark_dists(spark, LINE, BfsSpec("x", 4, reverse=True), 10)
    assert d == {4: 0, 3: 1, 2: 2, 1: 3, 0: 4}


def test_depth_bound(spark):
    d = _spark_dists(spark, LINE, BfsSpec("x", 0), 2)
    assert d == {0: 0, 1: 1, 2: 2}


def test_cycle(spark):
    d = _spark_dists(spark, CYCLE6, BfsSpec("x", 0), 10)
    assert d == {i: i for i in range(6)}


def test_excluded_reach_but_not_expand(spark):
    # 0->1->2 and 0->3->2; excluding 1 must still reach 1 (dist 1) but 2
    # only via 3 (dist 2).
    edges = [(0, 1), (1, 2), (0, 3), (3, 2)]
    d = _spark_dists(spark, edges, BfsSpec("x", 0, excluded=1), 5)
    assert d == {0: 0, 1: 1, 3: 1, 2: 2}
    # now excluding 3: 2 is reached through 1 (same dist here)
    edges2 = [(0, 1), (1, 4), (4, 2), (0, 3), (3, 2)]
    d2 = _spark_dists(spark, edges2, BfsSpec("x", 0, excluded=3), 5)
    assert d2 == {0: 0, 1: 1, 3: 1, 4: 2, 2: 3}


def test_unreachable_absent(spark):
    edges = [(0, 1), (2, 3)]
    d = _spark_dists(spark, edges, BfsSpec("x", 0), 5)
    assert d == {0: 0, 1: 1}


def test_multi_tag_independent(spark):
    edges = [(0, 1), (1, 2), (2, 0)]
    out = bounded_bfs(
        spark,
        edges_df(spark, edges),
        [BfsSpec("a", 0), BfsSpec("b", 2, reverse=True)],
        5,
    )
    rows = {(r["tag"], r["v"]): r["dist"] for r in out.collect()}
    assert rows[("a", 0)] == 0 and rows[("a", 2)] == 2
    assert rows[("b", 2)] == 0 and rows[("b", 0)] == 2


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("reverse", [False, True])
def test_random_graph_matches_reference(spark, seed, reverse):
    pdf = random_graph(60, 3.0, seed)
    edges = list(pdf.itertuples(index=False, name=None))
    root = int(pdf.src.iloc[0])
    got = _spark_dists(spark, edges, BfsSpec("x", root, reverse=reverse), 4)
    want = py_bfs(edges, root, reverse=reverse, max_depth=4)
    assert got == want


@pytest.mark.parametrize("seed", [3, 4])
def test_random_graph_excluded_matches_reference(spark, seed):
    pdf = random_graph(50, 3.0, seed)
    edges = list(pdf.itertuples(index=False, name=None))
    root = int(pdf.src.iloc[0])
    excl = int(pdf.dst.iloc[0])
    got = _spark_dists(spark, edges, BfsSpec("x", root, excluded=excl), 4)
    want = py_bfs(edges, root, excluded=excl, max_depth=4)
    assert got == want


def test_distance_table_columns_and_semantics(spark):
    dt = distance_table(spark, edges_df(spark, PAPER_EDGES), 0, 1, 4)
    rows = {r["v"]: r for r in dt.collect()}
    assert set(dt.columns) == {"v", "ds", "dt", "dsf", "dtf"}
    # reference: ds excludes expanding through t=1, dt reverse excludes s=0
    ds_ref = py_bfs(PAPER_EDGES, 0, excluded=1, max_depth=4)
    dt_ref = py_bfs(PAPER_EDGES, 1, excluded=0, reverse=True, max_depth=4)
    for v, r in rows.items():
        assert r["ds"] == ds_ref.get(v)
        assert r["dt"] == dt_ref.get(v)
    assert rows[0]["ds"] == 0 and rows[1]["dt"] == 0


def test_distance_table_full_vs_restricted(spark):
    # with the exclusion, some distances can only grow
    edges = [(0, 2), (2, 1), (0, 1), (1, 3), (3, 2)]
    dt = distance_table(spark, edges_df(spark, edges), 0, 1, 4)
    rows = {r["v"]: r for r in dt.collect()}
    for v, r in rows.items():
        if r["ds"] is not None and r["dsf"] is not None:
            assert r["ds"] >= r["dsf"]
        if r["dt"] is not None and r["dtf"] is not None:
            assert r["dt"] >= r["dtf"]
