"""Build the paper's evaluation tables (2–7) from harness measurements.

Each ``tableN_rows`` function aggregates raw :class:`QueryStats` rows into
the same shape the paper prints, and ``render`` produces an aligned text /
markdown table for EXPERIMENTS.md.  Conventions copied from §7.1: metrics
are arithmetic means over the query set; a star marks configurations where
more than 20% of queries ran out of time; timed-out queries contribute the
time limit as their query time.
"""
from __future__ import annotations

from collections import defaultdict

from repro.exp.harness import QueryStats

STAR_FRAC = 0.20


def _mean(xs: list[float]) -> float:
    return sum(xs) / len(xs) if xs else float("nan")


def _sci(x: float | None) -> str:
    if x is None or x != x:
        return "-"
    return f"{x:.2e}"


def _group(stats: list[QueryStats], keys: tuple[str, ...]) -> dict[tuple, list[QueryStats]]:
    g: dict[tuple, list[QueryStats]] = defaultdict(list)
    for st in stats:
        g[tuple(getattr(st, k) for k in keys)].append(st)
    return dict(g)


def render(headers: list[str], rows: list[list[str]], title: str = "") -> str:
    """Markdown-ish aligned table."""
    widths = [max(len(h), *(len(r[i]) for r in rows)) if rows else len(h) for i, h in enumerate(headers)]
    def fmt(cells):
        return "| " + " | ".join(c.ljust(w) for c, w in zip(cells, widths)) + " |"
    lines = ([f"### {title}"] if title else []) + [
        fmt(headers),
        "|" + "|".join("-" * (w + 2) for w in widths) + "|",
        *[fmt(r) for r in rows],
    ]
    return "\n".join(lines)


# ---------------------------------------------------------------- Table 2
def table2_rows(suite_stats: list[dict]) -> tuple[list[str], list[list[str]]]:
    """Dataset properties of the synthetic suite (paper Table 2 analogue)."""
    headers = ["Name", "Emulates", "|V|", "|E|", "d_avg", "Type"]
    rows = [
        [d["name"], d["emulates"], str(d["V"]), str(d["E"]), str(d["d_avg"]), d["category"]]
        for d in suite_stats
    ]
    return headers, rows


# ---------------------------------------------------------------- Table 3
def table3_rows(stats: list[QueryStats], algos: tuple[str, ...]) -> tuple[list[str], list[list[str]]]:
    """Overall comparison: query time / throughput / response time, plus
    the #Edges-accessed column (Figure 6's metric) — at dataflow scale the
    per-join overhead compresses wall-time gaps, so the edge counts carry
    the paper's orders-of-magnitude pruning claim."""
    headers = (
        ["Dataset"]
        + [f"QT(ms) {a}" for a in algos]
        + [f"TP(#/s) {a}" for a in algos]
        + ["RT(ms) BC-DFS", "RT(ms) IDX-DFS"]
        + ["#Edges BC-DFS", "#Edges IDX-DFS"]
    )
    rows = []
    for (graph,), _g in sorted(_group(stats, ("graph",)).items()):
        by_algo = _group(_g, ("algo",))
        qt, tp = [], []
        for a in algos:
            sts = by_algo.get((a,), [])
            t_ms = _mean([s.query_s * 1000 for s in sts])
            star = "*" if sts and sum(s.timed_out for s in sts) / len(sts) > STAR_FRAC else ""
            qt.append(_sci(t_ms) + star)
            tp.append(_sci(_mean([s.throughput for s in sts])))
        rt, ea = [], []
        for a in ("BC-DFS", "IDX-DFS"):
            sts = by_algo.get((a,), [])
            vals = [s.response_s * 1000 for s in sts if s.response_s is not None]
            rt.append(_sci(_mean(vals)) if vals else "-")
            ea.append(_sci(_mean([float(s.edges_accessed) for s in sts])) if sts else "-")
        rows.append([graph] + qt + tp + rt + ea)
    return headers, rows


# ---------------------------------------------------------------- Table 4
def table4_rows(
    stats: list[QueryStats], *, t_short_s: float, t_long_s: float
) -> tuple[list[str], list[list[str]]]:
    """Query-time distribution per k: fraction < t_short and > t_long
    (the paper's <60s / >120s columns, scaled)."""
    headers = ["Graph", "k"]
    algos = ("BC-DFS", "IDX-DFS")
    for a in algos:
        headers += [f"{a} <short", f"{a} >long"]
    rows = []
    for (graph, k), _g in sorted(_group(stats, ("graph", "k")).items()):
        by_algo = _group(_g, ("algo",))
        cells = [graph, str(k)]
        for a in algos:
            sts = by_algo.get((a,), [])
            n = len(sts)
            lt = sum(1 for s in sts if s.query_s < t_short_s and not s.timed_out)
            gt = sum(1 for s in sts if s.timed_out or s.query_s > t_long_s)
            cells += [f"{lt / n:.3f}" if n else "-", f"{gt / n:.3f}" if n else "-"]
        rows.append(cells)
    return headers, rows


# ---------------------------------------------------------------- Table 5
def table5_rows(
    stats: list[QueryStats], *, t_short_s: float
) -> tuple[list[str], list[list[str]]]:
    """Outlier-query performance: throughput / response time for short
    (< t_short, completed) vs long (timed-out) queries (paper Table 5)."""
    headers = ["Method", "TP short", "TP long", "RT(ms) short", "RT(ms) long"]
    rows = []
    for a in ("BC-DFS", "IDX-DFS"):
        sts = [s for s in stats if s.algo == a]
        short = [s for s in sts if not s.timed_out and s.query_s < t_short_s]
        long_ = [s for s in sts if s.timed_out]
        rows.append(
            [
                a,
                _sci(_mean([s.throughput for s in short])),
                _sci(_mean([s.throughput for s in long_])),
                _sci(_mean([s.response_s * 1000 for s in short if s.response_s is not None])),
                _sci(_mean([s.response_s * 1000 for s in long_ if s.response_s is not None])),
            ]
        )
    return headers, rows


# ---------------------------------------------------------------- Table 6
def table6_rows(stats: list[QueryStats]) -> tuple[list[str], list[list[str]]]:
    """Average and maximum #results per (graph, k), from IDX-DFS runs; a
    star marks values where enumeration hit the time limit (lower bounds)."""
    headers = ["Graph", "k", "avg #results", "max #results"]
    rows = []
    for (graph, k), _g in sorted(_group(stats, ("graph", "k")).items()):
        sts = [s for s in _g if s.algo == "IDX-DFS"]
        if not sts:
            continue
        star = "*" if any(s.timed_out for s in sts) else ""
        rows.append(
            [
                graph,
                str(k),
                _sci(_mean([float(s.n_results) for s in sts])) + star,
                _sci(max(float(s.n_results) for s in sts)) + star,
            ]
        )
    return headers, rows


# ---------------------------------------------------------------- Table 7
def table7_rows(stats: list[QueryStats]) -> tuple[list[str], list[list[str]]]:
    """Maximum memory (MB): the per-query index vs IDX-JOIN's materialised
    partial results, per (graph, k) (paper Table 7)."""
    headers = ["Graph", "k", "Index MB (max)", "IDX-JOIN partials MB (max)"]
    rows = []
    for (graph, k), _g in sorted(_group(stats, ("graph", "k")).items()):
        idx_mb = [s.index_mb for s in _g]
        part_mb = [s.partial_mb for s in _g if s.algo == "IDX-JOIN"]
        if not part_mb:
            continue
        rows.append([graph, str(k), f"{max(idx_mb):.3f}", f"{max(part_mb):.3f}"])
    return headers, rows
