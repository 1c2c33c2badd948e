"""Pure-Python unit tests for the table builders, using synthetic
QueryStats rows (no Spark)."""
from __future__ import annotations

import pytest

from repro.exp import tables as T
from repro.exp.harness import ALGOS, QueryStats


def mk(algo="IDX-DFS", graph="g", k=4, qid=0, query_s=1.0, n=100, timed_out=False,
       response_s=0.5, edges=50, index_mb=0.1, partial_mb=0.2, method=None):
    return QueryStats(
        graph=graph, qid=qid, s=0, t=1, k=k, algo=algo, prep_s=0.1, opt_s=0.0,
        enum_s=query_s - 0.1, query_s=query_s, n_results=n,
        throughput=n / query_s, response_s=response_s, timed_out=timed_out,
        edges_accessed=edges, n_index_edges=10, n_barrier_edges=20,
        index_mb=index_mb, partial_mb=partial_mb, method_chosen=method or algo,
    )


def full_set(graph="g", k=4, timed_out=False):
    return [mk(a, graph=graph, k=k, timed_out=timed_out,
               response_s=None if (a.endswith("JOIN") and timed_out) else 0.5)
            for a in ALGOS]


def test_table3_star_marks_timeouts():
    rows_raw = full_set() + [
        mk("BC-DFS", qid=1, timed_out=True, response_s=None),
        mk("BC-DFS", qid=2, timed_out=True, response_s=None),
    ]
    headers, rows = T.table3_rows(rows_raw, ALGOS)
    bc_qt = rows[0][1 + ALGOS.index("BC-DFS")]
    assert bc_qt.endswith("*")          # 2/3 timed out > 20%
    idx_qt = rows[0][1 + ALGOS.index("IDX-DFS")]
    assert not idx_qt.endswith("*")


def test_table3_multiple_graphs_sorted():
    raw = full_set("b") + full_set("a")
    _, rows = T.table3_rows(raw, ALGOS)
    assert [r[0] for r in rows] == ["a", "b"]


def test_table3_missing_algo_dash():
    raw = [mk("IDX-DFS")]
    headers, rows = T.table3_rows(raw, ALGOS)
    assert "-" in rows[0]


def test_table4_fractions():
    raw = [
        mk("BC-DFS", k=3, query_s=1.0),
        mk("BC-DFS", k=3, qid=1, query_s=30.0, timed_out=True),
        mk("IDX-DFS", k=3, query_s=1.0),
        mk("IDX-DFS", k=3, qid=1, query_s=2.0),
    ]
    _, rows = T.table4_rows(raw, t_short_s=10.0, t_long_s=20.0)
    assert rows[0] == ["g", "3", "0.500", "0.500", "1.000", "0.000"]


def test_table5_buckets():
    raw = [
        mk("IDX-DFS", query_s=1.0, n=1000),
        mk("IDX-DFS", qid=1, query_s=30.0, n=50000, timed_out=True, response_s=0.7),
        mk("BC-DFS", query_s=2.0, n=10),
    ]
    _, rows = T.table5_rows(raw, t_short_s=10.0)
    idx = rows[1]
    assert idx[0] == "IDX-DFS"
    assert idx[1] == f"{1000.0:.2e}"
    assert idx[2] == f"{50000/30.0:.2e}"


def test_table6_star_on_timeout():
    raw = [mk("IDX-DFS", n=10), mk("IDX-DFS", qid=1, n=30, timed_out=True)]
    _, rows = T.table6_rows(raw)
    assert rows[0][2].endswith("*") and rows[0][3].endswith("*")
    assert rows[0][2].startswith(f"{20.0:.2e}")


def test_table6_skips_graphs_without_idx_dfs():
    raw = [mk("BC-DFS")]
    _, rows = T.table6_rows(raw)
    assert rows == []


def test_table7_max_over_queries():
    raw = [
        mk("IDX-JOIN", partial_mb=1.0, index_mb=0.2),
        mk("IDX-JOIN", qid=1, partial_mb=5.0, index_mb=0.1),
        mk("IDX-DFS", partial_mb=9.0, index_mb=0.9),  # not IDX-JOIN: partials ignored
    ]
    _, rows = T.table7_rows(raw)
    assert rows[0][2] == "0.900"   # index max over all algos
    assert rows[0][3] == "5.000"   # partials max over IDX-JOIN only


def test_table7_requires_idx_join():
    raw = [mk("IDX-DFS")]
    _, rows = T.table7_rows(raw)
    assert rows == []


def test_group_helper():
    raw = [mk(graph="a", k=3), mk(graph="a", k=4), mk(graph="b", k=3)]
    g = T._group(raw, ("graph", "k"))
    assert set(g) == {("a", 3), ("a", 4), ("b", 3)}


def test_querystats_roundtrip():
    st = mk()
    d = st.to_dict()
    assert QueryStats(**d) == st


@pytest.mark.parametrize("x,want", [(0.0, "0.00e+00"), (12345.6, "1.23e+04"), (None, "-")])
def test_sci(x, want):
    assert T._sci(x) == want
