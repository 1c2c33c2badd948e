"""BC-DFS / BC-JOIN baselines: correctness vs. the oracle, and the
paper's key comparative claim — the index touches fewer edges than the
barrier-pruned search (Figure 6's #Edges metric, asserted as ordering)."""
from __future__ import annotations

import pytest

from repro import pathoracle as po
from repro.core.baselines import bc_dfs, bc_join
from repro.core.enumerate import idx_dfs, paths_to_strings
from repro.oracle import assert_equivalent
from tests.helpers import cached_ctx, edges_pdf, random_graph
from tests.test_enumerate import ALL_CASES


@pytest.mark.parametrize("name,edges,s,t,k", ALL_CASES, ids=[c[0] for c in ALL_CASES])
def test_bc_dfs_matches_oracle(spark, name, edges, s, t, k):
    ctx = cached_ctx(spark, edges, s, t, k)
    res = bc_dfs(ctx)
    assert_equivalent(
        paths_to_strings(res.paths), po.duckdb_path_sql(s, t, k), edges=edges_pdf(edges)
    )
    assert res.n_results == len(po.python_paths(edges, s, t, k))


@pytest.mark.parametrize("name,edges,s,t,k", ALL_CASES, ids=[c[0] for c in ALL_CASES])
def test_bc_join_matches_oracle(spark, name, edges, s, t, k):
    ctx = cached_ctx(spark, edges, s, t, k)
    res = bc_join(ctx)
    assert_equivalent(
        paths_to_strings(res.paths), po.duckdb_path_sql(s, t, k), edges=edges_pdf(edges)
    )
    assert res.n_results == len(po.python_paths(edges, s, t, k))


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_index_accesses_no_more_edges_than_barrier(spark, seed):
    """The central claim: IDX-DFS touches <= the candidate edges BC-DFS
    touches, because budget filters are pushed into the index lookup."""
    pdf = random_graph(60, 4.0, seed)
    edges = list(pdf.itertuples(index=False, name=None))
    s, t = int(pdf.src.iloc[0]), int(pdf.dst.iloc[len(pdf) // 3])
    if s == t:
        pytest.skip("degenerate")
    ctx = cached_ctx(spark, edges, s, t, 4)
    a = idx_dfs(ctx).edges_accessed
    b = bc_dfs(ctx).edges_accessed
    assert a <= b


def test_bc_join_uses_mid_cut(spark):
    from tests.helpers import PAPER_EDGES

    ctx = cached_ctx(spark, PAPER_EDGES, 0, 1, 4)
    res = bc_join(ctx)
    assert res.detail["cut"] == 2  # ceil(4/2)


def test_bc_dfs_timeout(spark):
    from tests.helpers import PAPER_EDGES

    ctx = cached_ctx(spark, PAPER_EDGES, 0, 1, 4)
    assert bc_dfs(ctx, timeout_s=0.0).timed_out
