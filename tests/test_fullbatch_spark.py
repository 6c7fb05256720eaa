"""Spark full-batch GraphSage vs numpy reference + DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.datasets import generate, n_vertices_of
from repro.graphs.generators import symmetrized, to_spark, undirected_view
from repro.gnn import layers
from repro.gnn.fullbatch import (
    features_to_spark,
    forward_spark,
    mean_aggregate,
    sage_layer_spark,
)
from repro.oracle import assert_equivalent
from pyspark.sql import functions as F


@pytest.fixture(scope="module")
def graph():
    edges = undirected_view(generate("EN", scale=1e-4, seed=0)).head(1500)
    sym = symmetrized(edges)
    return sym, n_vertices_of(edges)


class TestMeanAggregate:
    def test_matches_duckdb_oracle(self, spark, graph):
        sym, n = graph
        rng = np.random.default_rng(1)
        f = rng.random((n, 1))
        feats = features_to_spark(spark, f)
        got = mean_aggregate(to_spark(spark, sym), feats).select(
            "vertex", F.col("agg")[0].alias("agg0")
        )
        feats_pdf = pd.DataFrame({"vertex": np.arange(n), "f0": f[:, 0]})
        assert_equivalent(
            got,
            """
            SELECT e.dst AS vertex, AVG(f.f0) AS agg0
            FROM edges e JOIN feats f ON e.src = f.vertex
            GROUP BY e.dst
            """,
            edges=sym,
            feats=feats_pdf,
        )

    def test_matches_numpy(self, spark, graph):
        sym, n = graph
        rng = np.random.default_rng(2)
        f = rng.random((n, 3))
        ref = layers.mean_neighbors(f, sym["src"].to_numpy(), sym["dst"].to_numpy())
        got = (
            mean_aggregate(to_spark(spark, sym), features_to_spark(spark, f))
            .toPandas()
            .sort_values("vertex")
        )
        got_m = np.vstack(got["agg"].to_numpy())
        np.testing.assert_allclose(got_m, ref[got["vertex"].to_numpy()], atol=1e-12)


class TestSageLayerSpark:
    @pytest.mark.parametrize("n_layers", [1, 2])
    def test_forward_matches_numpy(self, spark, graph, n_layers):
        sym, n = graph
        rng = np.random.default_rng(3)
        f = rng.random((n, 4))
        dims = [4] + [3] * n_layers
        ws = layers.init_weights(dims, seed=7)
        ref = layers.forward(f, sym["src"].to_numpy(), sym["dst"].to_numpy(), ws)
        got = (
            forward_spark(to_spark(spark, sym), features_to_spark(spark, f), ws)
            .toPandas()
            .sort_values("vertex")
        )
        H = np.vstack(got["h"].to_numpy())
        np.testing.assert_allclose(H, ref[got["vertex"].to_numpy()], atol=1e-9)

    def test_isolated_vertices_keep_self_term(self, spark):
        # Vertex 2 has no edges at all; its output must be relu(h @ W_self).
        sym = pd.DataFrame({"src": [0, 1], "dst": [1, 0]})
        f = np.array([[1.0, 2.0], [3.0, 4.0], [5.0, 6.0]])
        w = layers.init_weights([2, 2], seed=0)[0]
        out = (
            sage_layer_spark(
                to_spark(spark, sym), features_to_spark(spark, f), w["W_self"], w["W_neigh"]
            )
            .toPandas()
            .sort_values("vertex")
        )
        expected = np.maximum(0.0, f[2] @ w["W_self"])
        np.testing.assert_allclose(np.array(out.iloc[2]["h"]), expected, atol=1e-12)

    def test_no_activation_option(self, spark):
        sym = pd.DataFrame({"src": [0], "dst": [1]})
        f = np.array([[-1.0], [-2.0]])
        w_self = np.array([[1.0]])
        w_neigh = np.array([[1.0]])
        out = (
            sage_layer_spark(
                to_spark(spark, sym), features_to_spark(spark, f), w_self, w_neigh,
                activation=False,
            )
            .toPandas()
            .sort_values("vertex")
        )
        assert out.iloc[1]["h"][0] == pytest.approx(-3.0)  # -2 + (-1), no relu
