"""Benchmark backing Table 4 (DistGNN track).

Measures the end-to-end cell pipeline — partition the OR stand-in with the
best partitioner (HEP100), derive partition stats, and evaluate the epoch
metrics for a representative configuration — i.e. everything that produces
one Table 4 entry. Regenerate the full table with
``python jobs/table4_distgnn_amortization.py``.
"""
import pytest

from repro.exp.harness import load_bundle
from repro.partitioning.base import run_partitioner
from repro.partitioning.edge.hep import hep100
from repro.partitioning.edge.random_ep import RandomEdgePartitioner
from repro.simulate.costmodel import ClusterModel
from repro.simulate.distgnn import GNNConfig, epoch_metrics, partition_stats

SCALE = 1e-3
K = 8


@pytest.fixture(scope="module")
def bundle():
    return load_bundle("OR", scale=SCALE, seed=0)


def table4_cell(bundle):
    cluster = ClusterModel()
    cfg = GNNConfig(feature=64, hidden=64, layers=3)
    out = {}
    for p in (RandomEdgePartitioner(), hep100()):
        run = run_partitioner(p, bundle.edges, K, n_vertices=bundle.n_vertices, seed=0)
        st = partition_stats(run.assignment, K)
        out[p.name] = epoch_metrics(st, cfg, cluster, scale=SCALE)
    return out["Random"].epoch_seconds / out["HEP100"].epoch_seconds


def test_bench_table4_cell(benchmark, bundle):
    speedup = benchmark.pedantic(table4_cell, args=(bundle,), rounds=3, iterations=1)
    assert speedup > 1.0  # HEP100 must beat Random for the cell to amortize
