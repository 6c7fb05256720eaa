"""Experiment harness: sweep graphs x partitioners x cluster sizes x configs.

Two suites mirror the paper's two tracks:

* :func:`run_distgnn_suite` — edge partitioners (vertex-cut), full-batch
  GraphSage; pure driver computation fed by really-executed partition runs.
* :func:`run_distdgl_suite` — vertex partitioners (edge-cut), mini-batch
  GraphSage/GCN/GAT; every row is fed by a really-executed Spark sampling
  epoch on the partitioned graph.

Partition runs and sampling epochs are cached per (graph, partitioner, k)
inside a suite invocation so the hyper-parameter grid never re-runs the
expensive parts. Jobs persist suite outputs under ``results/`` as parquet.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.datasets import generate, n_vertices_of, split_vertices
from repro.graphs.generators import symmetrized, to_spark, undirected_view
from repro.gnn.sampling import FANOUTS, plan_batches, sample_epoch
from repro.partitioning.base import PartitionRun, run_partitioner
from repro.partitioning.registry import make_edge_partitioner, make_vertex_partitioner
from repro.simulate import distdgl, distgnn
from repro.simulate.costmodel import ClusterModel, partition_time_model

#: Paper Table 3 hyper-parameter grid.
FEATURE_SIZES = (16, 64, 512)
HIDDEN_DIMS = (16, 64, 512)
NUM_LAYERS = (2, 3, 4)
MACHINES = (4, 8, 16, 32)

#: Paper global batch size 1024 at |V| ~ millions; scaled to our stand-ins
#: (the paper's GBS is ~0.3% of the training set — 64 keeps that order of
#: magnitude at bench scale while leaving multiple steps per epoch).
DEFAULT_GLOBAL_BATCH = 64


def hyper_grid(
    features=FEATURE_SIZES, hiddens=HIDDEN_DIMS, layer_counts=NUM_LAYERS, kind="sage"
) -> list[distgnn.GNNConfig]:
    return [
        distgnn.GNNConfig(feature=f, hidden=h, layers=l, kind=kind)
        for f, h, l in itertools.product(features, hiddens, layer_counts)
    ]


@dataclass
class GraphBundle:
    """One generated graph plus its split, shared across suite rows."""

    name: str
    edges: pd.DataFrame
    n_vertices: int
    split: pd.DataFrame
    train: np.ndarray = field(init=False)

    def __post_init__(self):
        self.train = self.split.loc[self.split["role"] == "train", "vertex"].to_numpy()


def load_bundle(name: str, *, scale: float, seed: int = 0) -> GraphBundle:
    edges = undirected_view(generate(name, scale=scale, seed=seed))
    n = n_vertices_of(edges)
    return GraphBundle(
        name=name, edges=edges, n_vertices=n, split=split_vertices(n, seed=7)
    )


def run_distgnn_suite(
    *,
    graphs=("HW", "DI", "EN", "EU", "OR"),
    partitioners=("Random", "DBH", "HDRF", "2PS-L", "HEP10", "HEP100"),
    ks=MACHINES,
    configs: list[distgnn.GNNConfig] | None = None,
    scale: float,
    seed: int = 0,
    cluster: ClusterModel | None = None,
) -> pd.DataFrame:
    """DistGNN track: one row per (graph, partitioner, k, config)."""
    cluster = cluster or ClusterModel()
    configs = configs or hyper_grid()
    rows = []
    for gname in graphs:
        b = load_bundle(gname, scale=scale, seed=seed)
        for k in ks:
            for pname in partitioners:
                run = run_partitioner(
                    make_edge_partitioner(pname), b.edges, k,
                    n_vertices=b.n_vertices, seed=seed,
                )
                st = distgnn.partition_stats(run.assignment, k)
                for cfg in configs:
                    m = distgnn.epoch_metrics(st, cfg, cluster, scale=scale)
                    rows.append(
                        {
                            "graph": gname,
                            "partitioner": pname,
                            "k": k,
                            "feature": cfg.feature,
                            "hidden": cfg.hidden,
                            "layers": cfg.layers,
                            "epoch_seconds": m.epoch_seconds,
                            "compute_seconds": m.compute_seconds,
                            "comm_seconds": m.comm_seconds,
                            "network_bytes": m.network_bytes,
                            "mem_max_bytes": float(m.mem_per_machine.max()),
                            "mem_balance": m.mem_balance,
                            "oom": m.oom,
                            "rf": st.replication_factor,
                            "vertex_balance": st.vertex_balance,
                            "edge_balance": st.edge_balance,
                            "partition_seconds": run.seconds,
                            "partition_seconds_norm": partition_time_model(
                                pname, run.seconds, len(b.edges)
                            ),
                        }
                    )
    df = pd.DataFrame(rows)
    return _with_random_baseline(
        df, ["graph", "k", "feature", "hidden", "layers"],
        ["epoch_seconds", "network_bytes", "mem_max_bytes", "rf"],
    )


def _with_random_baseline(
    df: pd.DataFrame, keys: list[str], cols: list[str]
) -> pd.DataFrame:
    """Join each row with the Random row of its group: speedup / % columns."""
    base = (
        df[df["partitioner"] == "Random"]
        .set_index(keys)[cols]
        .add_suffix("_random")
    )
    out = df.join(base, on=keys)
    out["speedup"] = out["epoch_seconds_random"] / out["epoch_seconds"]
    out["mem_pct_of_random"] = 100.0 * out["mem_max_bytes"] / out["mem_max_bytes_random"]
    out["net_pct_of_random"] = 100.0 * out["network_bytes"] / out["network_bytes_random"]
    if "rf" in cols:
        out["rf_pct_of_random"] = 100.0 * out["rf"] / out["rf_random"]
    return out


def run_distdgl_suite(
    spark: SparkSession,
    *,
    graphs=("HW", "DI", "EN", "EU", "OR"),
    partitioners=("Random", "LDG", "Spinner", "Metis", "ByteGNN", "KaHIP"),
    ks=(8,),
    features=FEATURE_SIZES,
    hiddens=HIDDEN_DIMS,
    layer_counts=NUM_LAYERS,
    kind: str = "sage",
    global_batch: int = DEFAULT_GLOBAL_BATCH,
    scale: float,
    seed: int = 0,
    cluster: ClusterModel | None = None,
) -> pd.DataFrame:
    """DistDGL track: one row per (graph, partitioner, k, config).

    The expensive pieces (partitioning, one Spark-executed sampling epoch
    per layer count) run once per (graph, partitioner, k); feature/hidden
    sweeps reuse them, mirroring how those knobs don't change the sampled
    graph.
    """
    cluster = cluster or ClusterModel()
    rows = []
    for gname in graphs:
        b = load_bundle(gname, scale=scale, seed=seed)
        sym_sdf = to_spark(spark, symmetrized(b.edges))
        for k in ks:
            for pname in partitioners:
                run = run_partitioner(
                    make_vertex_partitioner(pname), b.edges, k,
                    n_vertices=b.n_vertices, seed=seed, split=b.split,
                )
                owner = (
                    run.assignment.set_index("vertex")["part"].sort_index().to_numpy()
                )
                part_of = run.assignment.set_index("vertex")["part"]
                cut = float(
                    (
                        part_of[b.edges["src"]].to_numpy()
                        != part_of[b.edges["dst"]].to_numpy()
                    ).mean()
                )
                seeds = plan_batches(b.train, owner, k, global_batch, seed=seed)
                for L in layer_counts:
                    fanouts = FANOUTS[L]
                    stats = sample_epoch(
                        spark, sym_sdf, seeds, owner, fanouts,
                        seed=seed, global_batch=global_batch,
                    )
                    for f, h in itertools.product(features, hiddens):
                        cfg = distgnn.GNNConfig(feature=f, hidden=h, layers=L, kind=kind)
                        ph = distdgl.phase_times(stats, cfg, cluster, fanouts)
                        rows.append(
                            {
                                "graph": gname,
                                "partitioner": pname,
                                "k": k,
                                "kind": kind,
                                "global_batch": global_batch,
                                "feature": f,
                                "hidden": h,
                                "layers": L,
                                "epoch_seconds": ph.epoch_seconds,
                                "t_sampling": ph.sampling,
                                "t_fetch": ph.feature_fetch,
                                "t_forward": ph.forward,
                                "t_backward": ph.backward,
                                "network_bytes": distdgl.network_bytes(stats, cfg),
                                "edge_cut": cut,
                                "remote_inputs": stats.epoch_total("remote_inputs"),
                                "input_vertices": stats.epoch_total("input_vertices"),
                                "input_vertex_balance": stats.input_vertex_balance(),
                                "partition_seconds": run.seconds,
                                "partition_seconds_norm": partition_time_model(
                                    pname, run.seconds, len(b.edges)
                                ),
                            }
                        )
    df = pd.DataFrame(rows)
    base = (
        df[df["partitioner"] == "Random"]
        .set_index(["graph", "k", "feature", "hidden", "layers", "global_batch"])[
            ["epoch_seconds", "network_bytes", "remote_inputs", "edge_cut"]
        ]
        .add_suffix("_random")
    )
    out = df.join(base, on=["graph", "k", "feature", "hidden", "layers", "global_batch"])
    out["speedup"] = out["epoch_seconds_random"] / out["epoch_seconds"]
    out["net_pct_of_random"] = 100.0 * out["network_bytes"] / out["network_bytes_random"]
    out["remote_pct_of_random"] = (
        100.0 * out["remote_inputs"] / out["remote_inputs_random"]
    )
    out["cut_pct_of_random"] = 100.0 * out["edge_cut"] / out["edge_cut_random"]
    return out
