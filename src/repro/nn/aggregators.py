"""Aggregation kernels — the operator-level contribution of AGL (§3.3.2).

A GNN layer aggregates edge values into destination nodes
(``out[dst[e]] += val[e]``). AGL's *edge partitioning* strategy sorts
edges by destination so the adjacency splits into destination-disjoint
partitions that threads can reduce without conflicts. We reproduce the
CPU trade-off with three kernels:

- ``add_at``      — ``np.add.at`` buffered scatter: conflict-safe but
                    slow (the "conventional framework" kernel; our
                    DGL stand-in uses it).
- ``partitioned`` — destination-sorted segment reduction via
                    ``np.add.reduceat`` over ``t`` destination-disjoint
                    partitions, optionally on real threads. This is
                    AGL's edge-partitioning kernel.
- ``dense``       — materialise a dense |V|×|V| adjacency and matmul
                    (the PyG-1.3 stand-in's aggregation path).

All kernels are exact (no approximation) and are property-tested
against each other. Edge arrays are **assumed sorted by ``dst``** for
``partitioned`` — :mod:`repro.core.vectorize` guarantees this, exactly
as the paper states ("Edges in the sparse matrix are sorted by their
destination nodes").
"""
from __future__ import annotations

from concurrent.futures import ThreadPoolExecutor
from dataclasses import dataclass, field

import numpy as np

_POOL: ThreadPoolExecutor | None = None


def _pool() -> ThreadPoolExecutor:
    global _POOL
    if _POOL is None:
        _POOL = ThreadPoolExecutor(max_workers=8)
    return _POOL


def segment_starts(sorted_dst: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Return (unique destinations, start offsets) of a dst-sorted edge list.

    ``starts[i]`` is the first edge index of segment ``uniq[i]``;
    segments are contiguous because the input is sorted.
    """
    if sorted_dst.size == 0:
        return np.empty(0, dtype=sorted_dst.dtype), np.empty(0, dtype=np.int64)
    mask = np.empty(sorted_dst.shape, dtype=bool)
    mask[0] = True
    np.not_equal(sorted_dst[1:], sorted_dst[:-1], out=mask[1:])
    starts = np.flatnonzero(mask)
    return sorted_dst[starts], starts


def edge_partitions(n_edges: int, starts: np.ndarray, t: int) -> list[tuple[int, int]]:
    """Split ``n_edges`` dst-sorted edges into ≤``t`` destination-disjoint
    spans ``(lo, hi)``.

    Split points are snapped to segment boundaries so no destination row
    straddles two partitions — AGL's conflict-free property.
    """
    if n_edges == 0 or t <= 1 or starts.size <= 1:
        return [(0, n_edges)] if n_edges else []
    # Ideal split points, snapped to the nearest following segment start.
    cuts = [0]
    for i in range(1, t):
        ideal = i * n_edges // t
        j = int(np.searchsorted(starts, ideal, side="left"))
        cut = int(starts[j]) if j < starts.size else n_edges
        if cut > cuts[-1]:
            cuts.append(cut)
    if cuts[-1] != n_edges:
        cuts.append(n_edges)
    return list(zip(cuts[:-1], cuts[1:]))


@dataclass
class Aggregator:
    """Scatter/segment reduction engine for one kernel choice.

    Parameters
    ----------
    kind : {"add_at", "partitioned", "dense"}
    n_partitions : number of destination-disjoint partitions for the
        ``partitioned`` kernel.
    threads : run partitions on a thread pool (real parallelism for the
        memory-bound reduction since numpy releases the GIL in
        ``reduceat``); single-threaded partitioning is still faster
        than ``np.add.at`` because reduceat is an unbuffered segment sum.
    """

    kind: str = "partitioned"
    n_partitions: int = 8
    threads: bool = False

    def scatter_add(
        self, values: np.ndarray, dst: np.ndarray, n_nodes: int
    ) -> np.ndarray:
        """out[n_nodes, d] with out[dst[e]] += values[e]; dst sorted for
        'partitioned'."""
        d = values.shape[1] if values.ndim == 2 else 1
        out = np.zeros((n_nodes, d) if values.ndim == 2 else (n_nodes,), values.dtype)
        if values.shape[0] == 0:
            return out
        if self.kind == "add_at":
            np.add.at(out, dst, values)
            return out
        if self.kind == "dense":
            # One-hot destination matrix matmul — the dense path.
            onehot = np.zeros((n_nodes, dst.shape[0]), dtype=values.dtype)
            onehot[dst, np.arange(dst.shape[0])] = 1.0
            res = onehot @ (values if values.ndim == 2 else values[:, None])
            return res if values.ndim == 2 else res[:, 0]
        uniq, starts = segment_starts(dst)

        def reduce_span(lo: int, hi: int) -> None:
            s_lo = int(np.searchsorted(starts, lo, side="left"))
            s_hi = int(np.searchsorted(starts, hi, side="left"))
            seg = starts[s_lo:s_hi]
            if seg.size == 0:
                return
            out[uniq[s_lo:s_hi]] = np.add.reduceat(values[lo:hi], seg - lo, axis=0)

        spans = edge_partitions(dst.shape[0], starts, self.n_partitions)
        if self.threads and len(spans) > 1:
            list(_pool().map(lambda s: reduce_span(*s), spans))
        else:
            for lo, hi in spans:
                reduce_span(lo, hi)
        return out

    def gather_scale_reduce(
        self,
        M: np.ndarray,
        gather_idx: np.ndarray,
        scale: np.ndarray | None,
        sorted_dst: np.ndarray,
        n_nodes: int,
    ) -> np.ndarray:
        """Fused per-edge gather → scale → per-destination reduce:
        ``out[sorted_dst[e]] += scale[e] * M[gather_idx[e]]``.

        This is the aggregation a GNN layer actually runs; fusing it is
        what makes edge partitioning pay off — each destination-disjoint
        span gathers, scales and reduces independently on its own
        thread, with no write conflicts (the paper's §3.3.2 argument).
        The ``add_at`` kernel runs the same math unfused + buffered,
        which is what conventional frameworks do.
        """
        out = np.zeros((n_nodes, M.shape[1]), dtype=M.dtype)
        m = gather_idx.shape[0]
        if m == 0:
            return out
        if self.kind in ("add_at", "dense"):
            vals = M[gather_idx]
            if scale is not None:
                vals = vals * scale[:, None]
            np.add.at(out, sorted_dst, vals)
            return out
        uniq, starts = segment_starts(sorted_dst)

        def reduce_span(lo: int, hi: int) -> None:
            s_lo = int(np.searchsorted(starts, lo, side="left"))
            s_hi = int(np.searchsorted(starts, hi, side="left"))
            seg = starts[s_lo:s_hi]
            if seg.size == 0:
                return
            vals = M[gather_idx[lo:hi]]
            if scale is not None:
                vals = vals * scale[lo:hi, None]
            out[uniq[s_lo:s_hi]] = np.add.reduceat(vals, seg - lo, axis=0)

        spans = edge_partitions(m, starts, self.n_partitions)
        if self.threads and len(spans) > 1:
            list(_pool().map(lambda s: reduce_span(*s), spans))
        else:
            for lo, hi in spans:
                reduce_span(lo, hi)
        return out

    def segment_max(self, values: np.ndarray, dst: np.ndarray, n_nodes: int) -> np.ndarray:
        """Per-destination max of 1-D edge values (−inf for empty rows)."""
        out = np.full(n_nodes, -np.inf, dtype=values.dtype)
        if values.shape[0] == 0:
            return out
        if self.kind in ("add_at", "dense"):
            np.maximum.at(out, dst, values)
            return out
        uniq, starts = segment_starts(dst)
        out[uniq] = np.maximum.reduceat(values, starts)
        return out

    def segment_softmax(
        self, scores: np.ndarray, dst: np.ndarray, n_nodes: int
    ) -> np.ndarray:
        """Numerically-stable softmax of edge scores within each
        destination segment (GAT attention, §2.2 / Veličković et al.)."""
        mx = self.segment_max(scores, dst, n_nodes)
        ex = np.exp(scores - mx[dst])
        denom = self.scatter_add(ex[:, None], dst, n_nodes)[:, 0]
        return ex / np.maximum(denom[dst], 1e-30)


def gather(values: np.ndarray, idx: np.ndarray) -> np.ndarray:
    """Row gather; trivial but named for symmetry with scatter_add."""
    return values[idx]
