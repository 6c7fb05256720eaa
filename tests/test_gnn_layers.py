"""Unit tests for the numpy reference GNN layers."""
import numpy as np
import pytest

from repro.gnn import layers


@pytest.fixture
def tiny_graph():
    # 0 -> 2, 1 -> 2, 2 -> 3 (directed edge list, dst aggregates src)
    src = np.array([0, 1, 2])
    dst = np.array([2, 2, 3])
    h = np.array([[1.0, 0.0], [3.0, 2.0], [5.0, 4.0], [7.0, 6.0]])
    return src, dst, h


class TestMeanNeighbors:
    def test_hand_computed(self, tiny_graph):
        src, dst, h = tiny_graph
        agg = layers.mean_neighbors(h, src, dst)
        np.testing.assert_allclose(agg[2], [2.0, 1.0])  # mean of rows 0 and 1
        np.testing.assert_allclose(agg[3], [5.0, 4.0])  # row 2
        np.testing.assert_allclose(agg[0], [0.0, 0.0])  # no in-edges

    def test_self_loops_count(self):
        h = np.array([[2.0], [4.0]])
        agg = layers.mean_neighbors(h, np.array([0, 1]), np.array([0, 0]))
        np.testing.assert_allclose(agg[0], [3.0])


class TestInitWeights:
    def test_shapes_and_determinism(self):
        a = layers.init_weights([8, 4, 2], seed=3)
        b = layers.init_weights([8, 4, 2], seed=3)
        assert a[0]["W_self"].shape == (8, 4)
        assert a[1]["W_neigh"].shape == (4, 2)
        np.testing.assert_array_equal(a[0]["W_self"], b[0]["W_self"])

    @pytest.mark.parametrize("kind,keys", [
        ("sage", {"W_self", "W_neigh"}),
        ("gcn", {"W"}),
        ("gat", {"W", "a_src", "a_dst"}),
    ])
    def test_kinds(self, kind, keys):
        w = layers.init_weights([4, 2], kind=kind)
        assert set(w[0]) == keys

    def test_unknown_kind_raises(self):
        with pytest.raises(ValueError):
            layers.init_weights([4, 2], kind="transformer")


@pytest.mark.parametrize("kind", ["sage", "gcn", "gat"])
class TestLayers:
    def test_output_shape_and_nonnegative(self, tiny_graph, kind):
        src, dst, h = tiny_graph
        w = layers.init_weights([2, 3], kind=kind, seed=0)[0]
        out = layers._LAYER_FNS[kind](h, src, dst, w)
        assert out.shape == (4, 3)
        assert (out >= 0).all()  # relu

    def test_forward_stacks_layers(self, tiny_graph, kind):
        src, dst, h = tiny_graph
        ws = layers.init_weights([2, 3, 2], kind=kind, seed=0)
        out = layers.forward(h, src, dst, ws, kind=kind)
        assert out.shape == (4, 2)

    def test_deterministic(self, tiny_graph, kind):
        src, dst, h = tiny_graph
        ws = layers.init_weights([2, 3], kind=kind, seed=0)
        a = layers.forward(h, src, dst, ws, kind=kind)
        b = layers.forward(h, src, dst, ws, kind=kind)
        np.testing.assert_array_equal(a, b)


class TestSageSemantics:
    def test_isolated_vertex_uses_only_self(self):
        h = np.array([[1.0, 1.0], [2.0, 2.0]])
        w = {"W_self": np.eye(2), "W_neigh": np.ones((2, 2))}
        out = layers.sage_layer(h, np.array([0]), np.array([1]), w)
        np.testing.assert_allclose(out[0], h[0])  # vertex 0 has no in-edges
        np.testing.assert_allclose(out[1], h[1] + h[0] @ np.ones((2, 2)))


class TestGATSemantics:
    def test_uniform_attention_reduces_to_mean(self):
        # With zero attention vectors every edge gets equal weight.
        h = np.array([[1.0], [3.0], [0.0]])
        w = {"W": np.eye(1), "a_src": np.zeros(1), "a_dst": np.zeros(1)}
        out = layers.gat_layer(h, np.array([0, 1]), np.array([2, 2]), w)
        np.testing.assert_allclose(out[2], [(1.0 + 3.0) / 2])


class TestLayerFlops:
    def test_monotone_in_edges(self):
        for kind in ("sage", "gcn", "gat"):
            assert layers.layer_flops(kind, 100, 2000, 16, 16) > layers.layer_flops(
                kind, 100, 1000, 16, 16
            )

    def test_sage_doubles_dense_cost(self):
        sage = layers.layer_flops("sage", 100, 0, 16, 16)
        gcn = layers.layer_flops("gcn", 100, 0, 16, 16)
        assert sage == 2 * gcn

    def test_gat_pays_attention_premium(self):
        assert layers.layer_flops("gat", 100, 5000, 16, 16) > layers.layer_flops(
            "gcn", 100, 5000, 16, 16
        )

    def test_unknown_kind_raises(self):
        with pytest.raises(ValueError):
            layers.layer_flops("mlp", 1, 1, 1, 1)
