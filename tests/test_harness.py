"""Integration tests for the experiment harness and table assembly."""
import numpy as np
import pandas as pd
import pytest

from repro.exp import tables
from repro.exp.harness import (
    DEFAULT_GLOBAL_BATCH,
    hyper_grid,
    load_bundle,
    run_distdgl_suite,
    run_distgnn_suite,
)
from repro.simulate.distgnn import GNNConfig

SCALE = 1e-4


@pytest.fixture(scope="module")
def gnn_suite():
    return run_distgnn_suite(
        graphs=("EU",),
        ks=(4, 8),
        configs=[GNNConfig(64, 64, 2), GNNConfig(512, 64, 3)],
        scale=SCALE,
        seed=0,
    )


@pytest.fixture(scope="module")
def dgl_suite(spark):
    return run_distdgl_suite(
        spark,
        graphs=("EN",),
        partitioners=("Random", "LDG", "Metis"),
        ks=(4,),
        features=(16, 512),
        hiddens=(64,),
        layer_counts=(2,),
        scale=SCALE,
        seed=0,
    )


class TestHyperGrid:
    def test_full_grid_size(self):
        assert len(hyper_grid()) == 27  # 3 x 3 x 3 (paper Table 3)

    def test_bundle_loads(self):
        b = load_bundle("OR", scale=SCALE, seed=0)
        assert b.n_vertices > 0
        assert len(b.train) == int(b.n_vertices * 0.1)


class TestDistGNNSuite:
    def test_row_count(self, gnn_suite):
        # 1 graph x 2 ks x 6 partitioners x 2 configs
        assert len(gnn_suite) == 24

    def test_random_has_speedup_one(self, gnn_suite):
        rnd = gnn_suite[gnn_suite["partitioner"] == "Random"]
        assert np.allclose(rnd["speedup"], 1.0)

    def test_hep_beats_random(self, gnn_suite):
        hep = gnn_suite[gnn_suite["partitioner"] == "HEP100"]
        assert (hep["speedup"] > 1.0).all()
        assert (hep["mem_pct_of_random"] < 100.0).all()

    def test_quality_constant_across_configs(self, gnn_suite):
        # RF depends only on (graph, partitioner, k), not on GNN params.
        g = gnn_suite.groupby(["graph", "partitioner", "k"])["rf"].nunique()
        assert (g == 1).all()

    def test_speedup_column_consistent(self, gnn_suite):
        row = gnn_suite[gnn_suite["partitioner"] == "HDRF"].iloc[0]
        assert row["speedup"] == pytest.approx(
            row["epoch_seconds_random"] / row["epoch_seconds"]
        )


class TestDistDGLSuite:
    def test_row_count(self, dgl_suite):
        # 1 graph x 1 k x 3 partitioners x 2 features x 1 hidden x 1 layer
        assert len(dgl_suite) == 6

    def test_random_speedup_one(self, dgl_suite):
        rnd = dgl_suite[dgl_suite["partitioner"] == "Random"]
        assert np.allclose(rnd["speedup"], 1.0)

    def test_metis_reduces_remote_and_cut(self, dgl_suite):
        m = dgl_suite[dgl_suite["partitioner"] == "Metis"]
        assert (m["remote_pct_of_random"] < 100).all()
        assert (m["cut_pct_of_random"] < 100).all()

    def test_epoch_decomposition(self, dgl_suite):
        row = dgl_suite.iloc[0]
        total = (
            row["t_sampling"] + row["t_fetch"] + row["t_forward"] + row["t_backward"]
        )
        assert row["epoch_seconds"] >= total  # + update
        assert row["epoch_seconds"] == pytest.approx(total, rel=0.2)

    def test_global_batch_recorded(self, dgl_suite):
        assert (dgl_suite["global_batch"] == DEFAULT_GLOBAL_BATCH).all()


class TestTables:
    def test_amortization_table_shape(self, gnn_suite):
        t = tables.amortization_table(
            gnn_suite, partitioners=["DBH", "HDRF", "HEP100"]
        )
        assert list(t.columns) == ["DBH", "HDRF", "HEP100"]
        assert list(t.index) == ["EU"]

    def test_amortization_values_positive(self, gnn_suite):
        t = tables.amortization_table(gnn_suite, partitioners=["HEP100"])
        v = t.loc["EU", "HEP100"]
        assert v is None or v > 0

    def test_render_handles_no(self):
        t = pd.DataFrame({"A": [None, 1.5]}, index=["G1", "G2"])
        md = tables.render_amortization(t)
        assert "no" in md and "1.50" in md

    def test_render_markdown_plain(self):
        df = pd.DataFrame({"x": [1.0]}, index=["r"])
        md = tables.render_markdown(df)
        assert md.startswith("| Graph | x |")

    def test_mean_speedups_excludes_random(self, gnn_suite):
        sp = tables.mean_speedups(gnn_suite)
        assert "Random" not in set(sp["partitioner"])

    def test_quality_table_unique_rows(self, gnn_suite):
        q = tables.quality_table(gnn_suite, ["rf", "vertex_balance"])
        assert not q.duplicated(["graph", "partitioner", "k"]).any()
