"""K-layer GNN models + prediction head, and hierarchical model
segmentation (§3.4 step 1: a K-layer model splits into K+1 slices).

A model is K stacked GNN layers followed by a dense prediction head
applied only to target-node embeddings (the paper's ``look_up`` +
prediction model). ``to_slices`` / ``layer_from_slice`` serialise each
layer's parameters as plain dicts so GraphInfer can broadcast slice k
to the k-th Reduce round.
"""
from __future__ import annotations

import numpy as np

from . import losses
from .aggregators import Aggregator
from .edges import Edges
from .layers import DenseLayer, GATLayer, GCNLayer, Layer, SAGELayer

#: task name -> (loss fn, metric fn, metric name)
TASKS = {
    "multiclass": (losses.softmax_xent, losses.accuracy, "accuracy"),
    "multilabel": (losses.bce_with_logits, losses.micro_f1, "micro_f1"),
    "binary": (losses.logistic_loss, losses.auc, "auc"),
}

#: whether each layer kind aggregates over self-loop-augmented edges
NEEDS_SELF_LOOPS = {"gcn": True, "sage": False, "gat": True}


def _make_layer(kind: str, d_in: int, d_out: int, n_heads: int, act: str, seed: int) -> Layer:
    if kind == "gcn":
        return GCNLayer(d_in, d_out, act=act, seed=seed)
    if kind == "sage":
        return SAGELayer(d_in, d_out, act=act, seed=seed)
    if kind == "gat":
        return GATLayer(d_in, d_out, n_heads=n_heads, act=act, seed=seed)
    raise ValueError(kind)


class GNNModel:
    """K GNN layers + dense head; hand-rolled autograd over the stack."""

    def __init__(
        self,
        kind: str,
        d_in: int,
        hidden: int,
        n_out: int,
        n_layers: int,
        task: str,
        n_heads: int = 1,
        seed: int = 0,
    ):
        self.kind, self.task, self.n_layers = kind, task, n_layers
        self.n_heads = n_heads if kind == "gat" else 1
        act = "elu" if kind == "gat" else "relu"
        self.layers: list[Layer] = []
        d = d_in
        for i in range(n_layers):
            lyr = _make_layer(kind, d, hidden, self.n_heads, act, seed + i)
            self.layers.append(lyr)
            d = hidden * self.n_heads
        self.head = DenseLayer(d, n_out, act="id", seed=seed + 100)
        self.loss_fn, self.metric_fn, self.metric_name = TASKS[task]

    # ---- parameter plumbing (flat namespaced dicts for the PS) ----
    def _named(self) -> list[tuple[str, Layer]]:
        return [(f"l{i}", l) for i, l in enumerate(self.layers)] + [("head", self.head)]

    def get_params(self) -> dict[str, np.ndarray]:
        return {f"{p}/{k}": v for p, l in self._named() for k, v in l.params.items()}

    def set_params(self, flat: dict[str, np.ndarray]) -> None:
        for p, l in self._named():
            for k in l.params:
                np.copyto(l.params[k], flat[f"{p}/{k}"])

    def get_grads(self) -> dict[str, np.ndarray]:
        return {f"{p}/{k}": v for p, l in self._named() for k, v in l.grads.items()}

    def zero_grad(self) -> None:
        for _, l in self._named():
            l.zero_grad()

    def set_aggregator(self, agg: Aggregator) -> None:
        for _, l in self._named():
            l.agg = agg

    # ---- forward / backward ----
    def forward_embeddings(self, X: np.ndarray, adj_list: list[Edges]) -> np.ndarray:
        """Run the K GNN layers; ``adj_list[k]`` is the (possibly pruned)
        adjacency for layer k (Eq. 3)."""
        assert len(adj_list) == self.n_layers
        H = X
        for lyr, edges in zip(self.layers, adj_list):
            H = lyr.forward(H, edges)
        return H

    def forward(
        self, X: np.ndarray, adj_list: list[Edges], target_idx: np.ndarray
    ) -> np.ndarray:
        H = self.forward_embeddings(X, adj_list)
        self._target_idx, self._n_nodes = target_idx, X.shape[0]
        return self.head.forward(H[target_idx])

    def backward(self, dlogits: np.ndarray) -> None:
        dtarget = self.head.backward(dlogits)
        dH = np.zeros((self._n_nodes, dtarget.shape[1]))
        dH[self._target_idx] = dtarget
        for lyr in reversed(self.layers):
            dH = lyr.backward(dH)

    def loss_and_grad(
        self, X: np.ndarray, adj_list: list[Edges], target_idx: np.ndarray, labels: np.ndarray
    ) -> tuple[float, np.ndarray]:
        """One forward+backward; returns (loss, logits). Grads accumulate
        into ``.grads`` (call :meth:`zero_grad` first)."""
        logits = self.forward(X, adj_list, target_idx)
        loss, dlogits = self.loss_fn(logits, labels)
        self.backward(dlogits)
        return loss, logits

    # ---- hierarchical model segmentation (§3.4) ----
    def to_slices(self) -> list[dict]:
        """K+1 slices: one per GNN layer + the prediction model."""
        out = []
        for lyr in self.layers:
            if isinstance(lyr, GCNLayer):
                spec = {"kind": "gcn", "act": lyr.act}
            elif isinstance(lyr, SAGELayer):
                spec = {"kind": "sage", "act": lyr.act}
            else:
                assert isinstance(lyr, GATLayer)
                spec = {"kind": "gat", "act": lyr.act, "n_heads": lyr.n_heads, "d_out": lyr.d_out}
            spec["params"] = {k: v.copy() for k, v in lyr.params.items()}
            out.append(spec)
        out.append({"kind": "dense", "act": self.head.act,
                    "params": {k: v.copy() for k, v in self.head.params.items()}})
        return out


def layer_from_slice(spec: dict) -> Layer:
    """Rebuild a layer from a slice dict (used by GraphInfer workers)."""
    p = spec["params"]
    if spec["kind"] == "gcn":
        lyr = GCNLayer(*p["W"].shape, act=spec["act"])
    elif spec["kind"] == "sage":
        lyr = SAGELayer(*p["Wself"].shape, act=spec["act"])
    elif spec["kind"] == "gat":
        lyr = GATLayer(p["W0"].shape[0], spec["d_out"], n_heads=spec["n_heads"], act=spec["act"])
    elif spec["kind"] == "dense":
        lyr = DenseLayer(*p["W"].shape, act=spec["act"])
    else:
        raise ValueError(spec["kind"])
    for k in lyr.params:
        np.copyto(lyr.params[k], p[k])
    return lyr


def slice_needs_self_loops(spec: dict) -> bool:
    return spec["kind"] != "sage"
