"""Tests for the DistDGL-style mini-batch sampler (Spark + numpy stats)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.datasets import generate, n_vertices_of, split_vertices
from repro.graphs.generators import symmetrized, to_spark, undirected_view
from repro.gnn.sampling import (
    FANOUTS,
    EpochSamplingStats,
    plan_batches,
    sample_epoch,
    sampled_edges_per_layer,
)
from repro.partitioning.base import run_partitioner
from repro.partitioning.vertex.metis_like import MetisLikePartitioner
from repro.partitioning.vertex.random_vp import RandomVertexPartitioner


@pytest.fixture(scope="module")
def setup(spark):
    edges = undirected_view(generate("EN", scale=1e-4, seed=0))
    n = n_vertices_of(edges)
    split = split_vertices(n, seed=7)
    train = split.loc[split["role"] == "train", "vertex"].to_numpy()
    run = run_partitioner(MetisLikePartitioner(), edges, 4, n_vertices=n)
    owner = run.assignment.set_index("vertex")["part"].sort_index().to_numpy()
    sym = to_spark(spark, symmetrized(edges))
    return edges, n, train, owner, sym


class TestPlanBatches:
    def test_each_worker_contributes_each_step(self, setup):
        _, _, train, owner, _ = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        counts = seeds.groupby(["worker", "step"]).size()
        assert set(seeds["worker"].unique()) == set(range(4))
        assert counts.max() <= 16  # global_batch / k

    def test_steps_cover_training_set(self, setup):
        _, _, train, owner, _ = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        n_steps = seeds["step"].max() + 1
        assert n_steps == int(np.ceil(len(train) / 64))

    def test_seeds_are_local_to_their_worker(self, setup):
        _, _, train, owner, _ = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        assert (owner[seeds["vertex"]] == seeds["worker"]).all()

    def test_deterministic(self, setup):
        _, _, train, owner, _ = setup
        a = plan_batches(train, owner, 4, 64, seed=3)
        b = plan_batches(train, owner, 4, 64, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_only_train_vertices_used(self, setup):
        _, _, train, owner, _ = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        assert set(seeds["vertex"]).issubset(set(train))


class TestSampleEpoch:
    @pytest.fixture(scope="class")
    def stats(self, spark, setup) -> EpochSamplingStats:
        _, _, train, owner, sym = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        return sample_epoch(
            spark, sym, seeds, owner, FANOUTS[3], seed=0, global_batch=64
        )

    def test_fanout_cap_respected(self, stats):
        per_src = stats.sampled.groupby(["worker", "step", "layer", "src"]).size()
        for layer, fan in enumerate(FANOUTS[3]):
            layer_counts = per_src.xs(layer, level="layer")
            assert layer_counts.max() <= fan

    def test_sampled_edges_exist_in_graph(self, setup, stats):
        edges, _, _, _, _ = setup
        sym_pairs = set(
            map(tuple, symmetrized(edges)[["src", "dst"]].to_numpy())
        )
        got = set(map(tuple, stats.sampled[["src", "dst"]].to_numpy()))
        assert got.issubset(sym_pairs)

    def test_remote_inputs_bounded_by_inputs(self, stats):
        assert (stats.per_step["remote_inputs"] <= stats.per_step["input_vertices"]).all()

    def test_remote_accesses_bounded(self, stats):
        # Each remote input vertex can be accessed at most n_layers times.
        assert (
            stats.per_step["remote_accesses"]
            <= stats.n_layers * stats.per_step["remote_inputs"]
        ).all()

    def test_input_vertex_balance_at_least_one(self, stats):
        assert stats.input_vertex_balance() >= 1.0

    def test_straggler_is_max(self, stats):
        s = stats.straggler_per_step("sampled_edges")
        for step in range(stats.n_steps):
            sub = stats.per_step[stats.per_step["step"] == step]
            assert s[step] == sub["sampled_edges"].max()

    def test_per_layer_counts_sum_to_total(self, stats):
        per_layer = sampled_edges_per_layer(stats.sampled)
        assert per_layer["n"].sum() == len(stats.sampled)
        assert per_layer["n"].sum() == stats.epoch_total("sampled_edges")


class TestSamplingSemantics:
    def test_single_partition_has_no_remote(self, spark, setup):
        edges, n, train, _, sym = setup
        owner = np.zeros(n, dtype=np.int64)
        seeds = plan_batches(train, owner, 1, 64, seed=0)
        st = sample_epoch(spark, sym, seeds, owner, FANOUTS[2], seed=0)
        assert st.epoch_total("remote_inputs") == 0
        assert st.epoch_total("remote_accesses") == 0

    def test_worse_partitioning_means_more_remote(self, spark, setup):
        edges, n, train, owner_metis, sym = setup
        rnd = run_partitioner(RandomVertexPartitioner(), edges, 4, n_vertices=n)
        owner_rnd = rnd.assignment.set_index("vertex")["part"].sort_index().to_numpy()
        seeds_m = plan_batches(train, owner_metis, 4, 64, seed=0)
        seeds_r = plan_batches(train, owner_rnd, 4, 64, seed=0)
        st_m = sample_epoch(spark, sym, seeds_m, owner_metis, FANOUTS[2], seed=0)
        st_r = sample_epoch(spark, sym, seeds_r, owner_rnd, FANOUTS[2], seed=0)
        frac_m = st_m.epoch_total("remote_inputs") / st_m.epoch_total("input_vertices")
        frac_r = st_r.epoch_total("remote_inputs") / st_r.epoch_total("input_vertices")
        assert frac_m < frac_r

    def test_more_layers_sample_more(self, spark, setup):
        _, _, train, owner, sym = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        st2 = sample_epoch(spark, sym, seeds, owner, FANOUTS[2], seed=0)
        st4 = sample_epoch(spark, sym, seeds, owner, FANOUTS[4], seed=0)
        assert st4.epoch_total("sampled_edges") > st2.epoch_total("sampled_edges")
        assert st4.epoch_total("input_vertices") > st2.epoch_total("input_vertices")

    def test_deterministic_in_seed(self, spark, setup):
        _, _, train, owner, sym = setup
        seeds = plan_batches(train, owner, 4, 64, seed=0)
        a = sample_epoch(spark, sym, seeds, owner, FANOUTS[2], seed=5)
        b = sample_epoch(spark, sym, seeds, owner, FANOUTS[2], seed=5)
        pd.testing.assert_frame_equal(
            a.per_step.sort_values(["worker", "step"]).reset_index(drop=True),
            b.per_step.sort_values(["worker", "step"]).reset_index(drop=True),
        )

    def test_larger_batch_fewer_remote_per_seed(self, spark, setup):
        # Paper Sec 5.4: bigger batches overlap more, so remote vertices
        # *per seed* drop.
        _, _, train, owner, sym = setup
        small = plan_batches(train, owner, 4, 32, seed=0)
        large = plan_batches(train, owner, 4, 256, seed=0)
        st_s = sample_epoch(spark, sym, small, owner, FANOUTS[3], seed=0)
        st_l = sample_epoch(spark, sym, large, owner, FANOUTS[3], seed=0)
        per_seed_s = st_s.epoch_total("remote_inputs") / len(small)
        per_seed_l = st_l.epoch_total("remote_inputs") / len(large)
        assert per_seed_l < per_seed_s
