"""Subgraph vectorization (§3.3.1) + graph pruning (§3.3.2).

A batch of GraphFeatures ``B = {<root, label, subgraph>}`` is merged
into one local graph and vectorized into the three matrices the paper
names: the adjacency ``A_B`` (COO, edges **sorted by destination**),
the node-feature matrix ``X_B``, and (edge weights standing in for)
``E_B`` — plus target indices, labels, and each node's distance to the
nearest target, which drives pruning.

Pruning: for a K-layer model, layer k (0-indexed) only needs edges into
nodes that are still ≤ K−1−k hops from some target (the receptive field
shrinks by one hop per layer, Eq. 3). ``adj_list`` materialises the
per-layer pruned adjacencies ``A_B^(k)``; a test asserts target
embeddings are bit-identical with and without pruning (the paper's
correctness argument for the strategy).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..nn.edges import Edges
from .graphfeature import SubgraphRecord


@dataclass
class BatchGraph:
    """One vectorized batch: local ids 0..n−1, dst-sorted COO edges."""

    node_ids: np.ndarray  # [n] global ids
    X: np.ndarray  # [n, f]
    dists: np.ndarray  # [n] min hop distance to any target in the batch
    e_src: np.ndarray  # [m] local
    e_dst: np.ndarray  # [m] local, non-decreasing
    e_w: np.ndarray  # [m]
    target_idx: np.ndarray  # [b] local indices of the targets
    labels: np.ndarray  # [b, n_out]

    @property
    def n_nodes(self) -> int:
        return int(self.node_ids.shape[0])

    @property
    def n_edges(self) -> int:
        return int(self.e_src.shape[0])

    def edges_raw(self) -> Edges:
        return Edges(self.e_src, self.e_dst, self.e_w, self.n_nodes)

    def adj_list(self, n_layers: int, *, self_loops: bool, pruning: bool) -> list[Edges]:
        """Per-layer adjacencies A_B^(k), optionally pruned (Eq. 3).

        Self-loops (for GCN/GAT's {v} ∪ N_v^+ aggregation) are appended
        *before* pruning so a target's own loop always survives to the
        last layer (a self-loop into v is an in-edge of v).
        """
        base = self.edges_raw()
        if self_loops:
            base = base.with_self_loops()
        if not pruning:
            return [base] * n_layers
        out = []
        for k in range(n_layers):
            budget = n_layers - 1 - k
            keep = self.dists[base.dst] <= budget
            out.append(
                Edges(base.src[keep], base.dst[keep], base.w[keep], base.n_nodes)
            )
        return out


def merge_batch(records: list[SubgraphRecord]) -> BatchGraph:
    """Merge the subgraphs of a batch (§3.3.1) into one BatchGraph.

    Overlapping nodes dedup to one row (min distance over the batch —
    d(V_B, u) of the pruning section); duplicate edges dedup to one COO
    entry. Output edges are sorted by (dst, src), satisfying both the
    paper's A_B invariant and the edge-partitioning kernel.
    """
    if not records:
        raise ValueError("empty batch")
    gid = np.concatenate([r.node_ids for r in records])
    gdist = np.concatenate([r.dists for r in records])
    gfeat = np.concatenate([r.feats for r in records], axis=0)
    uniq, first = np.unique(gid, return_index=True)
    # min distance per global id (np.minimum.at over the dedup mapping)
    pos = np.searchsorted(uniq, gid)
    dists = np.full(uniq.shape[0], np.iinfo(np.int64).max)
    np.minimum.at(dists, pos, gdist)
    X = gfeat[first]

    es = np.concatenate([r.e_src for r in records]) if records else np.empty(0, np.int64)
    ed = np.concatenate([r.e_dst for r in records])
    ew = np.concatenate([r.e_w for r in records])
    ls, ld = np.searchsorted(uniq, es), np.searchsorted(uniq, ed)
    # dedup edges on (dst, src); weights agree across records by construction
    key = ld * uniq.shape[0] + ls
    order = np.argsort(key, kind="stable")
    keep = np.empty(order.shape[0], dtype=bool)
    if order.size:
        sk = key[order]
        keep[0] = True
        np.not_equal(sk[1:], sk[:-1], out=keep[1:])
    sel = order[keep]

    roots = np.array([r.root for r in records], dtype=np.int64)
    target_idx = np.searchsorted(uniq, roots)
    labels = np.stack([r.label for r in records])
    return BatchGraph(
        node_ids=uniq,
        X=X,
        dists=dists,
        e_src=ls[sel],
        e_dst=ld[sel],
        e_w=ew[sel],
        target_idx=target_idx,
        labels=labels,
    )


def whole_graph_batch(
    node_ids: np.ndarray,
    X: np.ndarray,
    e_src: np.ndarray,
    e_dst: np.ndarray,
    e_w: np.ndarray,
    target_ids: np.ndarray,
    labels: np.ndarray,
) -> BatchGraph:
    """The in-memory whole-graph 'batch' the DGL/PyG stand-ins train on
    (and the reference for Theorem-1 tests). Distances are 0 at targets
    and +inf elsewhere only matter for pruning, which whole-graph
    training does not use — set 0 everywhere."""
    order = np.lexsort((e_src, e_dst))
    lsrc = np.searchsorted(node_ids, e_src[order])
    ldst = np.searchsorted(node_ids, e_dst[order])
    return BatchGraph(
        node_ids=node_ids,
        X=X,
        dists=np.zeros(node_ids.shape[0], dtype=np.int64),
        e_src=lsrc,
        e_dst=ldst,
        e_w=e_w[order],
        target_idx=np.searchsorted(node_ids, target_ids),
        labels=labels,
    )
