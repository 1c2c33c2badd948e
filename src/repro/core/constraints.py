"""Variant-constraint extensions (paper Appendix E).

Three constraint families, each mapped onto the dataflow expansion:

* **Edge predicates** — a SQL predicate over edge attributes applied
  before distance computation, so the index itself only contains
  qualifying edges (the paper's "filter during the BFS" remark).
* **Accumulative values** (Algorithm 7) — edges carry a ``weight``; the
  frontier carries the running ⊕-accumulation (sum here, the paper's
  motivating example); a user predicate filters at emission, and an
  optional monotone predicate prunes partial results early.
* **Action sequences** (Algorithm 8) — edges carry a ``label``; the
  frontier carries an automaton state advanced by joining candidate edges
  with the transition relation; emission requires an accept state.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession


def apply_edge_predicate(edges: DataFrame, predicate_sql: str) -> DataFrame:
    """Pre-filter the edge list; build the query context on the result so
    index, distances and enumeration all respect the predicate."""
    return edges.where(predicate_sql)


@dataclass(frozen=True)
class AccumulativeConstraint:
    """sum-⊕ accumulative constraint: keep paths where ``emit_pred`` holds
    on the accumulated ``weight_col`` (SQL over the ``acc`` column)."""

    emit_pred: str                      # e.g. "acc >= 2.5"
    weight_col: str = "weight"
    init: float = 0.0
    prune_pred: str | None = None       # monotone-safe mid-search prune


@dataclass(frozen=True)
class AutomatonConstraint:
    """Label-sequence constraint driven by a DFA over edge labels."""

    start: str
    transitions: tuple[tuple[str, str, str], ...]  # (state, label, next)
    accepts: frozenset[str]
    label_col: str = "label"

    def transition_df(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(
            list(self.transitions), schema="a_state string, a_label string, a_next string"
        )


@dataclass(frozen=True)
class Constraints:
    """Bundle handed to the expansion engine / enumerators."""

    accumulative: AccumulativeConstraint | None = None
    automaton: AutomatonConstraint | None = None

    @property
    def frontier_cols(self) -> list[str]:
        cols = []
        if self.accumulative:
            cols.append("acc")
        if self.automaton:
            cols.append("state")
        return cols

    def init_frontier(self, frontier: DataFrame) -> DataFrame:
        if self.accumulative:
            frontier = frontier.withColumn("acc", F.lit(float(self.accumulative.init)))
        if self.automaton:
            frontier = frontier.withColumn("state", F.lit(self.automaton.start))
        return frontier


NO_CONSTRAINTS = Constraints()
