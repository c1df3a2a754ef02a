"""Layer forward semantics + full finite-difference gradient checks for
GCN / GraphSAGE / GAT / Dense, under every aggregation kernel."""
from __future__ import annotations

import numpy as np
import pytest

from repro.nn.aggregators import Aggregator
from repro.nn.edges import Edges
from repro.nn.layers import DenseLayer, GATLayer, GCNLayer, SAGELayer
from tests.nn_utils import layer_gradcheck, random_edges


def _X(n, d, seed=0):
    return np.random.default_rng(seed).standard_normal((n, d))


# ---------- Edges container ----------
def test_edges_sorted_by_dst():
    e = random_edges(10, 50, seed=1)
    assert (np.diff(e.dst) >= 0).all()


def test_edges_self_loops_count_and_sorted():
    e = random_edges(8, 30, seed=2).with_self_loops()
    assert e.m == 38
    assert (np.diff(e.dst) >= 0).all()
    for v in range(8):
        assert ((e.src == v) & (e.dst == v)).any()


def test_edges_scatter_to_src_equals_manual():
    e = random_edges(6, 40, seed=3)
    vals = np.random.default_rng(4).standard_normal((e.m, 3))
    ref = np.zeros((6, 3))
    np.add.at(ref, e.src, vals)
    for kind in ("add_at", "partitioned"):
        got = e.scatter_to_src(Aggregator(kind=kind), vals)
        np.testing.assert_allclose(got, ref, rtol=1e-12, atol=1e-12)


def test_edges_in_degrees():
    e = Edges.from_arrays([0, 1, 2, 2], [1, 1, 1, 0], [1.0, 2.0, 3.0, 4.0], 3)
    np.testing.assert_array_equal(e.in_degrees(), [1, 3, 0])
    np.testing.assert_array_equal(e.in_degrees(weighted=True), [4, 6, 0])


# ---------- forward semantics on tiny graphs ----------
def test_gcn_forward_is_weighted_mean():
    # 2 nodes, edge 0->1 weight 3, plus self loops weight 1.
    e = Edges.from_arrays([0], [1], [3.0], 2).with_self_loops()
    X = np.array([[1.0, 0.0], [0.0, 1.0]])
    lyr = GCNLayer(2, 2, act="id", seed=0)
    lyr.params["W"][:] = np.eye(2)
    lyr.params["b"][:] = 0
    H = lyr.forward(X, e)
    np.testing.assert_allclose(H[0], [1.0, 0.0])  # only self loop
    np.testing.assert_allclose(H[1], [3 / 4, 1 / 4])  # (3*x0 + 1*x1)/4


def test_sage_forward_mean_excludes_self():
    e = Edges.from_arrays([0, 2], [1, 1], None, 3)
    X = np.array([[2.0], [10.0], [4.0]])
    lyr = SAGELayer(1, 1, act="id", seed=0)
    lyr.params["Wself"][:] = 1.0
    lyr.params["Wnbr"][:] = 1.0
    lyr.params["b"][:] = 0.0
    H = lyr.forward(X, e)
    assert H[1, 0] == pytest.approx(10.0 + 3.0)  # self + mean(2,4)
    assert H[0, 0] == pytest.approx(2.0)  # no in-edges: mean term 0


def test_gat_forward_uniform_attention_when_scores_equal():
    # zero attention vectors -> softmax uniform -> mean over {self}∪N+
    e = Edges.from_arrays([0, 2], [1, 1], None, 3).with_self_loops()
    X = np.array([[3.0], [9.0], [6.0]])
    lyr = GATLayer(1, 1, n_heads=1, act="id", seed=0)
    lyr.params["W0"][:] = 1.0
    lyr.params["as0"][:] = 0.0
    lyr.params["ad0"][:] = 0.0
    lyr.params["b"][:] = 0.0
    H = lyr.forward(X, e)
    assert H[1, 0] == pytest.approx((3 + 9 + 6) / 3)
    assert H[0, 0] == pytest.approx(3.0)


def test_gat_attention_normalized_per_dst():
    e = random_edges(7, 30, seed=5).with_self_loops()
    lyr = GATLayer(4, 3, n_heads=2, seed=1)
    lyr.forward(_X(7, 4, seed=6), e)
    for hc in lyr._cache["heads"]:
        sums = np.zeros(7)
        np.add.at(sums, e.dst, hc["alpha"])
        np.testing.assert_allclose(sums, 1.0, rtol=1e-9)


def test_isolated_nodes_no_nan():
    # node 3 has no edges at all (SAGE path: deg clamp)
    e = Edges.from_arrays([0], [1], None, 4)
    for lyr in (SAGELayer(2, 2, seed=0),):
        H = lyr.forward(_X(4, 2), e)
        assert np.isfinite(H).all()


# ---------- gradient checks ----------
@pytest.mark.parametrize("kind", ["add_at", "partitioned"])
@pytest.mark.parametrize(
    "layer_fn,self_loops",
    [
        (lambda: GCNLayer(3, 2, act="relu", seed=7), True),
        (lambda: GCNLayer(3, 2, act="id", seed=8), True),
        (lambda: SAGELayer(3, 2, act="relu", seed=9), False),
        (lambda: GATLayer(3, 2, n_heads=1, act="elu", seed=10), True),
        (lambda: GATLayer(3, 2, n_heads=2, act="elu", seed=11), True),
    ],
    ids=["gcn-relu", "gcn-id", "sage", "gat-1h", "gat-2h"],
)
def test_layer_gradcheck(layer_fn, self_loops, kind):
    lyr = layer_fn()
    lyr.agg = Aggregator(kind=kind, n_partitions=3)
    e = random_edges(6, 18, seed=12, self_loops=self_loops)
    X = _X(6, 3, seed=13)
    layer_gradcheck(lyr, X, e, tol=2e-4)


def test_dense_gradcheck():
    lyr = DenseLayer(4, 3, act="id", seed=14)
    X = _X(5, 4, seed=15)
    from tests.nn_utils import numerical_grad

    rng = np.random.default_rng(16)
    R = rng.standard_normal((5, 3))
    lyr.zero_grad()
    lyr.forward(X)
    dX = lyr.backward(R)
    num = numerical_grad(lambda: float((lyr.forward(X) * R).sum()), X)
    np.testing.assert_allclose(dX, num, rtol=1e-5, atol=1e-6)
    numW = numerical_grad(lambda: float((lyr.forward(X) * R).sum()), lyr.params["W"])
    np.testing.assert_allclose(lyr.grads["W"], numW, rtol=1e-5, atol=1e-6)


@pytest.mark.parametrize(
    "layer_fn,self_loops",
    [
        (lambda: GCNLayer(3, 3, seed=1), True),
        (lambda: SAGELayer(3, 3, seed=1), False),
        (lambda: GATLayer(3, 3, seed=1), True),
    ],
    ids=["gcn", "sage", "gat"],
)
def test_kernels_agree_forward(layer_fn, self_loops):
    """add_at / partitioned / (dense for scatter) produce the same H."""
    e = random_edges(20, 80, seed=20, self_loops=self_loops)
    X = _X(20, 3, seed=21)
    outs = []
    for kind in ("add_at", "partitioned"):
        lyr = layer_fn()
        lyr.agg = Aggregator(kind=kind, n_partitions=5)
        outs.append(lyr.forward(X, e))
    np.testing.assert_allclose(outs[0], outs[1], rtol=1e-10, atol=1e-10)
