"""Join-based model tests: §3.1 relation construction, Algorithm 2's full
reducer (Proposition 4.2), Theorem 3.1 end-to-end vs. the DuckDB oracle."""
from __future__ import annotations

import pytest

from repro import pathoracle as po
from repro.core import relations as R
from repro.oracle import assert_equivalent
from tests.helpers import DIAMOND, LINE, PAPER_EDGES, edges_df, edges_pdf

CASES = [
    (PAPER_EDGES, 0, 1, 4),
    (PAPER_EDGES, 0, 1, 2),
    (PAPER_EDGES, 0, 1, 3),
    (DIAMOND, 0, 3, 2),
    (DIAMOND, 0, 3, 4),
    (LINE, 0, 4, 4),
    (LINE, 0, 4, 3),
]


@pytest.fixture(scope="module")
def paper_rels(spark):
    return R.build_relations(edges_df(spark, PAPER_EDGES), 0, 1, 4)


def test_number_of_relations(paper_rels):
    assert len(paper_rels) == 4


def test_r1_edges_out_of_s(paper_rels):
    rows = {(r["src"], r["dst"]) for r in paper_rels[0].collect()}
    assert rows == {(0, 2), (0, 6)}


def test_rk_edges_into_t_plus_padding(paper_rels):
    rows = {(r["src"], r["dst"]) for r in paper_rels[-1].collect()}
    assert (1, 1) in rows                      # (t,t) padding
    assert all(d == 1 for _, d in rows)
    assert (0, 1) not in rows                  # src != s in R_k


def test_mid_relations_exclude_s_and_t_sources(paper_rels):
    for rel in paper_rels[1:-1]:
        rows = {(r["src"], r["dst"]) for r in rel.collect()}
        assert (1, 1) in rows
        for u, v in rows - {(1, 1)}:
            assert u != 0 and v != 0 and u != 1


def test_full_reducer_removes_dangling(spark):
    # 5->6 dangles: 6 never reaches t within the chain.
    edges = [(0, 2), (2, 1), (5, 6), (2, 5)]
    rels = R.full_reducer(R.build_relations(edges_df(spark, edges), 0, 1, 3))
    for rel in rels:
        for r in rel.collect():
            assert (r["src"], r["dst"]) != (5, 6)


def test_full_reducer_proposition_4_2(spark):
    """After reduction every tuple joins into some result of Q (walks)."""
    rels = R.full_reducer(R.build_relations(edges_df(spark, PAPER_EDGES), 0, 1, 4))
    q = R.chain_join(rels).collect()
    used = [set() for _ in range(4)]
    for row in q:
        tup = row["tuple"]
        for i in range(4):
            used[i].add((tup[i], tup[i + 1]))
    for i, rel in enumerate(rels):
        remaining = {(r["src"], r["dst"]) for r in rel.collect()}
        assert remaining <= used[i], f"dangling tuples survived in R_{i+1}"


@pytest.mark.parametrize("edges,s,t,k", CASES, ids=range(len(CASES)))
@pytest.mark.parametrize("reduce", [False, True])
def test_chain_join_matches_oracle(spark, edges, s, t, k, reduce):
    got = R.enumerate_via_chain_join(edges_df(spark, edges), s, t, k, reduce=reduce)
    assert_equivalent(got, po.duckdb_path_sql(s, t, k), edges=edges_pdf(edges))


def test_chain_join_tuples_are_padded_walks(spark):
    rels = R.build_relations(edges_df(spark, PAPER_EDGES), 0, 1, 4)
    q = R.chain_join(rels)
    walks = po.python_walks(PAPER_EDGES, 0, 1, 4)
    got_walks = set()
    for row in q.collect():
        tup = list(row["tuple"])
        assert len(tup) == 5
        assert tup[0] == 0 and tup[-1] == 1
        first_t = tup.index(1)
        assert all(v == 1 for v in tup[first_t:])     # Lemma A.1
        got_walks.add(po.path_str(tup[: first_t + 1]))
    assert got_walks == walks                          # Lemma A.2


def test_k1_single_relation(spark):
    rels = R.build_relations(edges_df(spark, [(0, 1), (0, 2)]), 0, 1, 1)
    assert len(rels) == 1
    got = R.enumerate_via_chain_join(edges_df(spark, [(0, 1), (0, 2)]), 0, 1, 1)
    assert [r["path"] for r in got.collect()] == ["0-1"]


def test_invalid_k_raises(spark):
    with pytest.raises(ValueError):
        R.build_relations(edges_df(spark, LINE), 0, 1, 0)
