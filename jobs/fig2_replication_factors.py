"""Figures 2/4/5/6 series: edge-partitioner quality and partitioning time.

For every (graph, edge partitioner, k in {4, 32}): replication factor
(Fig 2), vertex balance (Fig 4), edge balance, memory-utilization balance
at a representative config (Fig 5), and measured + normalized partitioning
time (Fig 6). The RF/balance numbers come from the really-executed
partition assignments via the same stats the DistGNN simulator consumes.
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

import pandas as pd

from _common import make_session, save_and_print
from repro.exp.harness import load_bundle
from repro.partitioning.base import run_partitioner
from repro.partitioning.registry import EDGE_PARTITIONERS, make_edge_partitioner
from repro.simulate import distgnn
from repro.simulate.costmodel import ClusterModel, partition_time_model


def run(spark=None, *, scale: float = 1e-3, seed: int = 0, ks=(4, 32)) -> dict[str, pd.DataFrame]:
    cluster = ClusterModel()
    cfg = distgnn.GNNConfig(feature=512, hidden=64, layers=3)
    rows = []
    for gname in ("HW", "DI", "EN", "EU", "OR"):
        b = load_bundle(gname, scale=scale, seed=seed)
        for k in ks:
            for pname in EDGE_PARTITIONERS:
                r = run_partitioner(
                    make_edge_partitioner(pname), b.edges, k,
                    n_vertices=b.n_vertices, seed=seed,
                )
                st = distgnn.partition_stats(r.assignment, k)
                m = distgnn.epoch_metrics(st, cfg, cluster, scale=scale)
                rows.append(
                    {
                        "graph": gname,
                        "partitioner": pname,
                        "k": k,
                        "replication_factor": st.replication_factor,
                        "vertex_balance": st.vertex_balance,
                        "edge_balance": st.edge_balance,
                        "mem_balance": m.mem_balance,
                        "partition_seconds": r.seconds,
                        "partition_seconds_norm": partition_time_model(
                            pname, r.seconds, len(b.edges)
                        ),
                    }
                )
    df = pd.DataFrame(rows)
    rf = df.pivot_table(
        index=["graph", "partitioner"], columns="k", values="replication_factor"
    ).round(2)
    vb = df.pivot_table(
        index=["graph", "partitioner"], columns="k", values="vertex_balance"
    ).round(2)
    return {"quality": df, "fig2_rf": rf.reset_index(), "fig4_vb": vb.reset_index()}


if __name__ == "__main__":
    save_and_print(
        "fig2_replication_factors", run(), print_keys=("fig2_rf", "fig4_vb")
    )
