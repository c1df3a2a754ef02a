"""Shared helpers for nn-substrate tests: random graphs + gradcheck."""
from __future__ import annotations

import numpy as np

from repro.nn.edges import Edges


def random_edges(n_nodes: int, m: int, seed: int = 0, self_loops: bool = False) -> Edges:
    rng = np.random.default_rng(seed)
    src = rng.integers(0, n_nodes, m)
    dst = rng.integers(0, n_nodes, m)
    w = rng.random(m) + 0.1
    e = Edges.from_arrays(src, dst, w, n_nodes)
    return e.with_self_loops() if self_loops else e


def numerical_grad(f, x: np.ndarray, eps: float = 1e-6) -> np.ndarray:
    """Central-difference gradient of scalar f w.r.t. array x."""
    g = np.zeros_like(x, dtype=np.float64)
    it = np.nditer(x, flags=["multi_index"])
    while not it.finished:
        i = it.multi_index
        orig = x[i]
        x[i] = orig + eps
        fp = f()
        x[i] = orig - eps
        fm = f()
        x[i] = orig
        g[i] = (fp - fm) / (2 * eps)
        it.iternext()
    return g


def layer_gradcheck(layer, X: np.ndarray, edges: Edges, seed: int = 0, tol: float = 1e-5):
    """Check analytic dX and all parameter grads of ``layer`` against
    central differences on loss = sum(forward * R)."""
    rng = np.random.default_rng(seed)
    H = layer.forward(X, edges)
    R = rng.standard_normal(H.shape)

    def loss() -> float:
        return float((layer.forward(X, edges) * R).sum())

    layer.zero_grad()
    layer.forward(X, edges)
    dX = layer.backward(R)
    num_dX = numerical_grad(lambda: loss(), X)
    np.testing.assert_allclose(dX, num_dX, rtol=tol, atol=tol)
    for name, p in layer.params.items():
        num = numerical_grad(lambda: loss(), p)
        np.testing.assert_allclose(
            layer.grads[name], num, rtol=tol, atol=tol, err_msg=f"param {name}"
        )
