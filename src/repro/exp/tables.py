"""Assemble the paper's evaluation tables from harness suite outputs.

Table 4 (DistGNN) and Table 5 (DistDGL) report the average number of
epochs until partitioning time is amortized by faster training, per
(graph, partitioner) — averaged over the hyper-parameter grid, with "no"
when the partitioner slows training down (paper Sections 4.3(5), 5.3(5)).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.simulate.amortization import epochs_to_amortize, format_epochs


def amortization_table(
    suite: pd.DataFrame,
    *,
    partitioners: list[str],
    graphs: list[str] | None = None,
    time_col: str = "partition_seconds_norm",
) -> pd.DataFrame:
    """Average epochs-to-amortize per (graph, partitioner) — Tables 4 / 5.

    For each config row the savings vs Random are computed; the paper
    averages the resulting epoch counts per (graph, partitioner). Configs
    with a slowdown contribute "no amortization"; a (graph, partitioner)
    cell is "no" when the *average* saving is non-positive.
    """
    graphs = graphs or sorted(suite["graph"].unique())
    out = {}
    for g in graphs:
        row = {}
        for p in partitioners:
            sub = suite[(suite["graph"] == g) & (suite["partitioner"] == p)]
            if sub.empty:
                row[p] = None
                continue
            epochs = [
                epochs_to_amortize(
                    r[time_col], r["epoch_seconds_random"], r["epoch_seconds"]
                )
                for _, r in sub.iterrows()
            ]
            realized = [e for e in epochs if e is not None]
            # "no" if the majority of configs cannot amortize.
            row[p] = (
                float(np.mean(realized))
                if len(realized) > len(epochs) / 2
                else None
            )
        out[g] = row
    return pd.DataFrame(out).T[partitioners]


def render_markdown(df: pd.DataFrame, *, index_name: str = "Graph") -> str:
    """Minimal markdown table renderer (no tabulate in the offline env)."""
    cols = list(df.columns)
    lines = [
        "| " + " | ".join([index_name] + [str(c) for c in cols]) + " |",
        "|" + "---|" * (len(cols) + 1),
    ]
    for idx, row in df.iterrows():
        cells = [
            v if isinstance(v, str) else ("" if pd.isna(v) else f"{v:.2f}")
            for v in row.tolist()
        ]
        lines.append("| " + " | ".join([str(idx)] + cells) + " |")
    return "\n".join(lines)


def render_amortization(table: pd.DataFrame) -> str:
    """Markdown rendering, "no" for non-amortizing cells as in the paper."""
    return render_markdown(table.map(format_epochs))


def mean_speedups(
    suite: pd.DataFrame, *, by=("graph", "partitioner", "k")
) -> pd.DataFrame:
    """Average speedup vs Random over the hyper-parameter grid."""
    return (
        suite[suite["partitioner"] != "Random"]
        .groupby(list(by))["speedup"]
        .agg(["mean", "min", "max"])
        .reset_index()
    )


def mean_metric_pct(
    suite: pd.DataFrame, col: str, *, by=("graph", "partitioner", "k")
) -> pd.DataFrame:
    """Average <col> (a %-of-Random column) over the grid."""
    return (
        suite[suite["partitioner"] != "Random"]
        .groupby(list(by))[col]
        .mean()
        .reset_index()
    )


def quality_table(suite: pd.DataFrame, cols: list[str]) -> pd.DataFrame:
    """One row per (graph, partitioner, k) with partitioning-quality cols."""
    return (
        suite.groupby(["graph", "partitioner", "k"])[cols].first().reset_index()
    )
