"""Light-weight index tests: Algorithm 3 semantics, Proposition 4.3, the
Appendix-B pruning-power comparison against the full reducer, and the
barrier edge set used by the baselines."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro import pathoracle as po
from repro.core import relations as R
from repro.core.index import c_i, index_size_bytes
from tests.helpers import PAPER_EDGES, cached_ctx, edges_df, py_bfs, random_graph


@pytest.fixture(scope="module")
def ctx(spark):
    return cached_ctx(spark, PAPER_EDGES, 0, 1, 4)


def _idx_edges(ctx) -> set[tuple[int, int]]:
    return {(r["src"], r["dst"]) for r in ctx.index_edges.collect()}


def test_index_edges_subset_of_graph(ctx):
    assert _idx_edges(ctx) <= set(PAPER_EDGES)


def test_index_excludes_t_sources_and_s_targets(ctx):
    for u, v in _idx_edges(ctx):
        assert u != ctx.t and v != ctx.s


def test_index_edge_rule(ctx):
    """Every index edge satisfies ds(src) + 1 + dt(dst) <= k (Alg. 3's H
    condition) and src in X (ds+dt <= k)."""
    k = ctx.k
    for r in ctx.index_edges.collect():
        assert r["ds_src"] + 1 + r["dt_dst"] <= k
        assert r["ds_src"] + r["dt_src"] <= k


def test_index_distances_match_reference(ctx):
    ds_ref = py_bfs(PAPER_EDGES, 0, excluded=1, max_depth=4)
    dt_ref = py_bfs(PAPER_EDGES, 1, excluded=0, reverse=True, max_depth=4)
    for r in ctx.index_edges.collect():
        assert r["ds_src"] == ds_ref[r["src"]]
        assert r["dt_dst"] == dt_ref[r["dst"]]


def test_proposition_4_3(ctx):
    """Every vertex at position i of a valid path is in C_i."""
    k = ctx.k
    paths = po.python_paths(PAPER_EDGES, 0, 1, k)
    parts = [
        {r["v"] for r in c_i(ctx.dist, i, k).collect()} for i in range(k + 1)
    ]
    for p in paths:
        vs = [int(x) for x in p.split("-")]
        for i, v in enumerate(vs):
            assert v in parts[i], f"vertex {v} at position {i} of {p} not in C_{i}"


def test_every_path_edge_in_index(ctx):
    """Completeness: the index keeps every edge of every valid path."""
    idx = _idx_edges(ctx)
    for p in po.python_paths(PAPER_EDGES, 0, 1, 4):
        vs = [int(x) for x in p.split("-")]
        for uv in zip(vs, vs[1:]):
            assert uv in idx


def test_c0_and_ck(ctx):
    k = ctx.k
    assert {r["v"] for r in c_i(ctx.dist, 0, k).collect()} == {ctx.s}
    assert {r["v"] for r in c_i(ctx.dist, k, k).collect()} == {ctx.t}


def test_dangling_vertex_excluded(ctx):
    """Vertex 7 (and 107) are disconnected from s/t — never indexed."""
    vs = {r["src"] for r in ctx.index_edges.collect()} | {
        r["dst"] for r in ctx.index_edges.collect()
    }
    assert 7 not in vs and 107 not in vs


def test_index_vs_full_reducer_pruning_power(spark, ctx):
    """Appendix B: the index keeps every edge the reduced relations keep
    (union over positions), i.e. competitive pruning power."""
    rels = R.full_reducer(R.build_relations(edges_df(spark, PAPER_EDGES), 0, 1, 4))
    reduced_edges = set()
    for rel in rels:
        for r in rel.collect():
            if r["src"] != 1:  # skip the (t,t) padding
                reduced_edges.add((r["src"], r["dst"]))
    assert reduced_edges <= _idx_edges(ctx)


@pytest.mark.parametrize("seed", [0, 1])
def test_index_vs_full_reducer_random(spark, seed):
    pdf = random_graph(40, 2.5, seed)
    edges = list(pdf.itertuples(index=False, name=None))
    s, t = int(pdf.src.iloc[0]), int(pdf.dst.iloc[-1])
    if s == t:
        pytest.skip("degenerate")
    k = 4
    ctx = cached_ctx(spark, edges, s, t, k)
    rels = R.full_reducer(R.build_relations(edges_df(spark, edges), s, t, k))
    reduced = set()
    for rel in rels:
        for r in rel.collect():
            if r["src"] != t:
                reduced.add((r["src"], r["dst"]))
    assert reduced <= _idx_edges(ctx)


def test_barrier_superset_of_index(ctx):
    bar = {(r["src"], r["dst"]) for r in ctx.barrier_edges.collect()}
    # barrier keeps edges out of t / into s; ignore those for comparison
    assert _idx_edges(ctx) <= bar


def test_barrier_rule(ctx):
    k = ctx.k
    for r in ctx.barrier_edges.collect():
        assert r["dsf_src"] + r["dtf_src"] <= k
        assert r["dsf_dst"] + r["dtf_dst"] <= k


def test_index_size_accounting(ctx):
    assert index_size_bytes(ctx.n_index_edges) == ctx.n_index_edges * 48
    assert ctx.n_index_edges == len(_idx_edges(ctx))


def test_extra_columns_pass_through(spark):
    e = edges_df(spark, PAPER_EDGES).withColumn("weight", F.lit(1.5))
    from repro.core.context import build_context

    ctx2 = build_context(spark, e, 0, 1, 4)
    assert "weight" in ctx2.index_edges.columns
    assert "weight" in ctx2.barrier_edges.columns
    ctx2.unpersist()
