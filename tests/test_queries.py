"""Workload generator tests (paper §7.1 query-set construction)."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.graphs import generators as G
from repro.graphs import queries as Q
from tests.helpers import py_bfs


@pytest.fixture(scope="module")
def gpdf():
    return G.powerlaw_graph_pdf(n=400, avg_deg=8, alpha=0.9, seed=11)


def test_degree_split_sizes(gpdf):
    hi, lo = Q.degree_split(gpdf)
    n = pd.concat([gpdf.src, gpdf.dst]).nunique()
    assert len(hi) == max(1, int(n * 0.10))
    assert len(hi) + len(lo) == n


def test_degree_split_ordering(gpdf):
    hi, lo = Q.degree_split(gpdf)
    deg = pd.concat([gpdf.src, gpdf.dst]).value_counts()
    assert min(deg[v] for v in hi) >= max(deg[v] for v in lo)


def test_bounded_dist_matches_reference(gpdf):
    adj = Q.adjacency(gpdf)
    edges = list(gpdf.itertuples(index=False, name=None))
    ref = py_bfs(edges, int(gpdf.src.iloc[0]), max_depth=3)
    root = int(gpdf.src.iloc[0])
    for v, d in list(ref.items())[:50]:
        if v == root:
            continue
        assert Q._bounded_dist(adj, root, v, 3) == d
    # unreachable-within-bound returns None
    far = [v for v in pd.concat([gpdf.src, gpdf.dst]).unique() if v not in ref]
    if far:
        assert Q._bounded_dist(adj, root, int(far[0]), 3) is None


@pytest.mark.parametrize("setting", Q.SETTINGS)
def test_generate_each_setting(gpdf, setting):
    qs = Q.generate_queries(gpdf, k=4, n_queries=5, setting=setting, seed=1)
    assert len(qs) == 5
    hi, lo = Q.degree_split(gpdf)
    hi_s, lo_s = set(hi.tolist()), set(lo.tolist())
    pool = {"h": hi_s, "l": lo_s}
    for q in qs:
        assert q.s != q.t
        assert q.k == 4
        assert q.s in pool[setting[0]]
        assert q.t in pool[setting[1]]


def test_distance_guarantee(gpdf):
    adj = Q.adjacency(gpdf)
    for q in Q.generate_queries(gpdf, k=4, n_queries=8, seed=3):
        d = Q._bounded_dist(adj, q.s, q.t, 3)
        assert d is not None and 1 <= d <= 3


def test_deterministic(gpdf):
    a = Q.generate_queries(gpdf, k=4, n_queries=6, seed=9)
    b = Q.generate_queries(gpdf, k=4, n_queries=6, seed=9)
    assert a == b
    c = Q.generate_queries(gpdf, k=4, n_queries=6, seed=10)
    assert a != c


def test_queries_distinct_pairs(gpdf):
    qs = Q.generate_queries(gpdf, k=5, n_queries=10, seed=2)
    assert len({(q.s, q.t) for q in qs}) == 10


def test_bad_setting_raises(gpdf):
    with pytest.raises(ValueError):
        Q.generate_queries(gpdf, k=4, n_queries=1, setting="xx")


def test_too_many_queries_raises():
    tiny = pd.DataFrame({"src": [0], "dst": [1]}).astype("int64")
    with pytest.raises(RuntimeError):
        Q.generate_queries(tiny, k=3, n_queries=50, seed=0, max_tries=200)
