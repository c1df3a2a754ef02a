"""GraphInfer (§3.4): slice segmentation, and the three-way equality
GraphInfer ≡ Original(GraphFeature) ≡ local whole-graph forward, per
model kind; sampling consistency; cost accounting."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.graphfeature import store_graph_features, load_graph_features
from repro.core.graphflat import build_graph_features
from repro.core.infer import (
    inference_cost_report,
    run_graph_infer,
    run_original_inference,
)
from repro.core.sampling import sample_in_edges
from repro.core.vectorize import whole_graph_batch
from repro.graphs.generators import uug_lite
from repro.nn.models import NEEDS_SELF_LOOPS, GNNModel, layer_from_slice


@pytest.fixture(scope="module")
def setup(spark):
    ds = uug_lite(n=150, seed=71)
    nodes_df, edges_df = ds.to_spark(spark)
    return ds, nodes_df.cache(), edges_df.cache()


def _model(ds, kind, k=2, seed=9):
    return GNNModel(kind, ds.feat_dim, 6, 1, k, "binary", seed=seed)


def _local_scores(ds, model, kind):
    ids = ds.nodes["id"].to_numpy()
    bg = whole_graph_batch(
        ids, ds.feat_matrix(), ds.edges["src"].to_numpy(), ds.edges["dst"].to_numpy(),
        ds.edges["w"].to_numpy(), ids, np.zeros((len(ids), 1)),
    )
    adj = bg.adj_list(model.n_layers, self_loops=NEEDS_SELF_LOOPS[kind], pruning=False)
    return model.forward(bg.X, adj, np.arange(len(ids)))


def test_slices_count_and_roundtrip(setup):
    ds, _, _ = setup
    model = _model(ds, "gat")
    slices = model.to_slices()
    assert len(slices) == 3  # K + 1 with K=2
    for spec in slices:
        lyr = layer_from_slice(spec)
        for k, v in spec["params"].items():
            np.testing.assert_array_equal(lyr.params[k], v)


@pytest.mark.parametrize("kind", ["gcn", "sage", "gat"])
def test_graph_infer_matches_local_forward(spark, setup, kind):
    """Every node's distributed score equals the single-machine
    whole-graph forward — the slice-wise pipeline is exact."""
    ds, nodes_df, edges_df = setup
    model = _model(ds, kind)
    got = run_graph_infer(nodes_df, edges_df, model.to_slices()).toPandas()
    got = got.sort_values("id").reset_index(drop=True)
    want = _local_scores(ds, model, kind)
    assert len(got) == len(ds.nodes)
    np.testing.assert_allclose(
        np.array([s[0] for s in got["score"]]), want[:, 0], rtol=1e-8, atol=1e-8
    )


@pytest.mark.parametrize("kind", ["gcn", "gat"])
def test_original_inference_matches_graph_infer(spark, setup, tmp_path, kind):
    """The Original per-GraphFeature baseline produces the same scores —
    it is only slower, never different (Table 5 compares cost only)."""
    ds, nodes_df, edges_df = setup
    model = _model(ds, kind)
    targets = spark.createDataFrame(pd.DataFrame({"id": ds.nodes["id"][:60]}))
    gf = build_graph_features(nodes_df, edges_df, targets, 2)
    path = str(tmp_path / f"gf_{kind}")
    store_graph_features(gf, path)
    orig = run_original_inference(
        load_graph_features(spark, path), model.to_slices(), n_layers=2
    ).toPandas().sort_values("id")
    gi = run_graph_infer(nodes_df, edges_df, model.to_slices()).toPandas()
    gi = gi[gi["id"].isin(set(orig["id"]))].sort_values("id")
    np.testing.assert_allclose(
        np.array([s[0] for s in orig["score"]]),
        np.array([s[0] for s in gi["score"]]),
        rtol=1e-8,
        atol=1e-8,
    )


def test_1layer_model_infer(spark, setup):
    ds, nodes_df, edges_df = setup
    model = _model(ds, "gcn", k=1)
    got = run_graph_infer(nodes_df, edges_df, model.to_slices()).toPandas()
    want = _local_scores(ds, model, "gcn")
    got = got.sort_values("id").reset_index(drop=True)
    np.testing.assert_allclose(
        np.array([s[0] for s in got["score"]]), want[:, 0], rtol=1e-8, atol=1e-8
    )


def test_sampling_consistency_training_vs_inference(spark, setup):
    """With the same (max_degree, strategy, seed), GraphInfer runs on the
    identical sampled edge set GraphFlat used (§3.4)."""
    ds, nodes_df, edges_df = setup
    sampled = sample_in_edges(edges_df, 3, strategy="uniform", seed=13).toPandas()
    model = _model(ds, "gcn")
    gi = run_graph_infer(
        nodes_df, edges_df, model.to_slices(), max_degree=3, seed=13
    ).toPandas().sort_values("id")
    # reference: local forward on the sampled graph
    ds2_edges = sampled.sort_values(["dst", "src"])
    ids = ds.nodes["id"].to_numpy()
    bg = whole_graph_batch(
        ids, ds.feat_matrix(), ds2_edges["src"].to_numpy(), ds2_edges["dst"].to_numpy(),
        ds2_edges["w"].to_numpy(), ids, np.zeros((len(ids), 1)),
    )
    want = model.forward(
        bg.X, bg.adj_list(2, self_loops=True, pruning=False), np.arange(len(ids))
    )
    np.testing.assert_allclose(
        np.array([s[0] for s in gi["score"]]), want[:, 0], rtol=1e-8, atol=1e-8
    )


def test_cost_report_shapes(spark, setup):
    ds, nodes_df, edges_df = setup
    targets = spark.createDataFrame(pd.DataFrame({"id": ds.nodes["id"].to_numpy()}))
    rep = inference_cost_report(
        edges_df, targets, 2, len(ds.nodes), len(ds.edges)
    )
    # all-node inference with overlapping 2-hop neighborhoods must cost
    # strictly more node computations for Original than for GraphInfer
    assert rep["original_node_computations"] > rep["graphinfer_node_computations"]
    assert rep["graphinfer_node_computations"] == 2 * len(ds.nodes)
    assert rep["graphinfer_edge_traversals"] == 2 * len(ds.edges)
    assert rep["original_edge_traversals"] > 0
