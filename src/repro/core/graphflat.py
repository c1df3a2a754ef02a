"""GraphFlat — distributed K-hop neighborhood generation (§3.2).

Two implementations of the same pipeline, both pure DataFrame dataflow:

1. :func:`graphflat_message_passing` — the paper's literal Map/Reduce
   rounds. Every node starts with *self information*; each Reduce round
   merges the information arriving from in-edge neighbors (shuffle key =
   destination node id) into new self information and propagates it
   along out-edges. After K rounds each node's self information *is*
   its K-hop neighborhood. Payloads are carried as array-of-struct
   columns — a faithful but payload-heavy formulation, used at test
   scale and as the semantic reference.

2. :func:`khop_members` + :func:`build_graph_features` — the
   root-anchored frontier formulation used at scale: K iterated
   ``join``/``groupBy`` rounds over (root, member) pairs, then one
   assembly pass that attaches features and collects each root's
   subgraph into a GraphFeature record. Produces exactly the same
   neighborhoods (tests assert equality against implementation 1 and
   against a DuckDB recursive-CTE BFS).

Direction convention (§2.1): an edge row (src, dst, w) is src → dst,
so ``dst``'s in-edge neighbors include ``src``; d(v, u) is the length
of the shortest directed path *from u to v*. The K-hop membership of
root v is {u : d(v, u) ≤ K}, reached by walking in-edges backwards from
v. The edge set kept for v is every in-edge of a member at distance
≤ K−1 — the sufficient-and-necessary set for a K-layer GNN (Theorem 1).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .sampling import sample_in_edges


def khop_members(edges: DataFrame, targets: DataFrame, k: int) -> DataFrame:
    """(root, id, dist) rows: all nodes within k in-hops of each root.

    ``targets`` needs an ``id`` column. ``dist`` is the exact shortest
    in-path length (ties resolved by min across rounds).
    """
    members = targets.select(
        F.col("id").alias("root"), F.col("id"), F.lit(0).alias("dist")
    )
    frontier = members
    for hop in range(1, k + 1):
        grown = (
            frontier.join(edges, frontier.id == edges.dst)
            .select("root", F.col("src").alias("id"), F.lit(hop).alias("dist"))
        )
        members = (
            members.unionByName(grown)
            .groupBy("root", "id")
            .agg(F.min("dist").alias("dist"))
        )
        # next frontier: only genuinely-new nodes at this distance
        frontier = members.filter(F.col("dist") == hop)
    return members


def subgraph_edges(edges: DataFrame, members: DataFrame, k: int) -> DataFrame:
    """(root, src, dst, w): in-edges of members at distance ≤ k−1.

    Both endpoints are guaranteed members (src sits at distance ≤ k)."""
    inner = members.filter(F.col("dist") <= k - 1).select("root", "id")
    return inner.join(edges, inner.id == edges.dst).select("root", "src", "dst", "w")


def build_graph_features(
    nodes: DataFrame,
    edges: DataFrame,
    targets: DataFrame,
    k: int,
    *,
    max_degree: int | None = None,
    strategy: str = "uniform",
    seed: int = 0,
    reindex_threshold: int | None = None,
) -> DataFrame:
    """The full GraphFlat pipeline → one GraphFeature row per target.

    Output schema: root, label, nodes: array<struct<id,dist,feat>>,
    edges: array<struct<src,dst,w>>. ``label`` comes from the node
    table. Sampling (if ``max_degree``) is applied to the edge table
    once, up front, so training and inference see the same sampled
    graph (§3.4 "maintain the consistence of data processing").
    """
    if max_degree is not None:
        edges = sample_in_edges(
            edges,
            max_degree,
            strategy=strategy,
            seed=seed,
            reindex_threshold=reindex_threshold,
        )
    members = khop_members(edges, targets, k)
    member_nodes = (
        members.join(nodes.select("id", "feat"), "id")
        .select("root", F.struct("id", "dist", "feat").alias("n"))
        .groupBy("root")
        .agg(F.array_sort(F.collect_list("n")).alias("nodes"))
    )
    sub_edges = (
        subgraph_edges(edges, members, k)
        .select("root", F.struct("src", "dst", "w").alias("e"))
        .groupBy("root")
        .agg(F.array_sort(F.collect_list("e")).alias("edges"))
    )
    out = (
        member_nodes.join(sub_edges, "root", "left")
        .withColumn("edges", F.coalesce("edges", F.array()))
        .join(nodes.select(F.col("id").alias("root"), "label"), "root")
    )
    return out.select("root", "label", "nodes", "edges")


def graphflat_message_passing(nodes: DataFrame, edges: DataFrame, k: int) -> DataFrame:
    """Literal merge/propagate pipeline (Figure 2) over *all* nodes.

    Returns (root, id, dist) membership identical to
    :func:`khop_members` run with every node as a target. Used as the
    semantic reference in tests; payload columns are arrays of structs,
    merged with explode → min-dist groupBy → re-collect, which is the
    DataFrame spelling of the paper's reducer merge.
    """
    # Map phase: self information = {(id, dist 0)}.
    state = nodes.select(
        F.col("id"), F.array(F.struct(F.col("id").alias("mid"), F.lit(0).alias("dist"))).alias("members")
    )
    for _ in range(k):
        # Propagate: each node sends its members along its out-edges;
        # received member distances grow by one hop.
        sent = (
            state.join(edges, state.id == edges.src)
            .select(F.col("dst").alias("id"), F.explode("members").alias("m"))
            .select("id", F.col("m.mid").alias("mid"), (F.col("m.dist") + 1).alias("dist"))
        )
        own = state.select("id", F.explode("members").alias("m")).select(
            "id", F.col("m.mid").alias("mid"), F.col("m.dist").alias("dist")
        )
        # Merge (reduce by shuffle key = id): min distance per member.
        merged = (
            own.unionByName(sent)
            .groupBy("id", "mid")
            .agg(F.min("dist").alias("dist"))
        )
        state = merged.select(
            "id", F.struct(F.col("mid"), F.col("dist")).alias("m")
        ).groupBy("id").agg(F.collect_list("m").alias("members"))
    return (
        state.select(F.col("id").alias("root"), F.explode("members").alias("m"))
        .select("root", F.col("m.mid").alias("id"), F.col("m.dist").alias("dist"))
    )
