"""Benchmark backing the Figure 12 edge-cut series (edge-cut metrics).

Measures the Spark SQL edge-cut computation over a real METIS-like
assignment of the road graph. Regenerate the series with
``python jobs/fig12_edge_cut.py``.
"""
import pytest

from repro.exp.harness import load_bundle
from repro.graphs.generators import to_spark
from repro.partitioning.base import assignment_to_spark, run_partitioner
from repro.partitioning.quality import edge_cut_quality
from repro.partitioning.vertex.metis_like import MetisLikePartitioner

SCALE = 1e-3
K = 8


@pytest.fixture(scope="module")
def prepared(spark):
    b = load_bundle("DI", scale=SCALE, seed=0)
    run = run_partitioner(
        MetisLikePartitioner(), b.edges, K, n_vertices=b.n_vertices, seed=0
    )
    edges_sdf = to_spark(spark, b.edges)
    assign_sdf = assignment_to_spark(spark, run)
    edges_sdf.cache().count()
    assign_sdf.cache().count()
    return edges_sdf, assign_sdf


def test_bench_fig12_cut(benchmark, prepared):
    edges_sdf, assign_sdf = prepared
    q = benchmark.pedantic(
        edge_cut_quality, args=(edges_sdf, assign_sdf, K), rounds=3, iterations=1
    )
    assert q.edge_cut_ratio < 0.2  # multilevel on a road mesh cuts little
