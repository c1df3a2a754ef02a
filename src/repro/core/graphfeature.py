"""GraphFeature records — the "flattened subgraph string" artifact of
GraphFlat (§3.2.1 step 3: *Storing*).

The paper flattens each K-hop neighborhood to a protobuf string on a
distributed filesystem. Protobuf is unavailable offline, so the
flattened form here is a compact JSON string column stored in parquet
on the local filesystem (substitution documented in DESIGN.md); the
property that matters — a self-contained, batch-loadable record per
target node — is preserved and round-trip tested.

:class:`SubgraphRecord` is the decoded in-memory form the trainer and
the "Original" inference baseline consume (plain numpy arrays).
"""
from __future__ import annotations

import json
from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

GF_SCHEMA = T.StructType(
    [
        T.StructField("root", T.LongType(), False),
        T.StructField("label", T.ArrayType(T.DoubleType()), True),
        T.StructField(
            "nodes",
            T.ArrayType(
                T.StructType(
                    [
                        T.StructField("id", T.LongType()),
                        T.StructField("dist", T.IntegerType()),
                        T.StructField("feat", T.ArrayType(T.DoubleType())),
                    ]
                )
            ),
        ),
        T.StructField(
            "edges",
            T.ArrayType(
                T.StructType(
                    [
                        T.StructField("src", T.LongType()),
                        T.StructField("dst", T.LongType()),
                        T.StructField("w", T.DoubleType()),
                    ]
                )
            ),
        ),
    ]
)


@dataclass
class SubgraphRecord:
    """One decoded GraphFeature: the K-hop neighborhood of ``root``."""

    root: int
    label: np.ndarray  # [n_out] or empty
    node_ids: np.ndarray  # [n] global ids; node_ids[?] == root somewhere
    dists: np.ndarray  # [n] hop distance from root
    feats: np.ndarray  # [n, f]
    e_src: np.ndarray  # [m] global ids
    e_dst: np.ndarray  # [m] global ids
    e_w: np.ndarray  # [m]

    @property
    def n_nodes(self) -> int:
        return int(self.node_ids.shape[0])

    @property
    def n_edges(self) -> int:
        return int(self.e_src.shape[0])

    def to_flat_string(self) -> str:
        """Flatten to the storable string form (protobuf stand-in)."""
        return json.dumps(
            {
                "root": int(self.root),
                "label": [float(x) for x in self.label],
                "nodes": [
                    [int(i), int(d), [float(x) for x in f]]
                    for i, d, f in zip(self.node_ids, self.dists, self.feats)
                ],
                "edges": [
                    [int(s), int(t), float(w)]
                    for s, t, w in zip(self.e_src, self.e_dst, self.e_w)
                ],
            },
            separators=(",", ":"),
        )

    def to_bytes(self) -> bytes:
        """Flatten to the compact binary storage form — the stand-in for
        the paper's protobuf string (decode is a few ``np.frombuffer``
        calls, so the disk-based trainer is not dominated by parsing,
        just as protobuf decoding is cheap)."""
        import struct

        n, m = self.n_nodes, self.n_edges
        f = self.feats.shape[1] if n else 0
        lab = np.asarray(self.label, dtype=np.float64)
        head = struct.pack("<qqqqq", int(self.root), lab.size, n, f, m)
        return b"".join(
            [
                head,
                lab.tobytes(),
                np.asarray(self.node_ids, dtype=np.int64).tobytes(),
                np.asarray(self.dists, dtype=np.int64).tobytes(),
                np.asarray(self.feats, dtype=np.float64).tobytes(),
                np.asarray(self.e_src, dtype=np.int64).tobytes(),
                np.asarray(self.e_dst, dtype=np.int64).tobytes(),
                np.asarray(self.e_w, dtype=np.float64).tobytes(),
            ]
        )

    @classmethod
    def from_bytes(cls, buf: bytes) -> "SubgraphRecord":
        import struct

        root, nl, n, f, m = struct.unpack_from("<qqqqq", buf, 0)
        o = 40

        def take(count, dtype):
            nonlocal o
            arr = np.frombuffer(buf, dtype=dtype, count=count, offset=o)
            o += arr.nbytes
            return arr

        label = take(nl, np.float64)
        node_ids = take(n, np.int64)
        dists = take(n, np.int64)
        feats = take(n * f, np.float64).reshape(n, f)
        return cls(
            root=int(root),
            label=label,
            node_ids=node_ids,
            dists=dists,
            feats=feats,
            e_src=take(m, np.int64),
            e_dst=take(m, np.int64),
            e_w=take(m, np.float64),
        )

    @classmethod
    def from_flat_string(cls, s: str) -> "SubgraphRecord":
        d = json.loads(s)
        nodes = d["nodes"]
        edges = d["edges"]
        f_dim = len(nodes[0][2]) if nodes else 0
        return cls(
            root=d["root"],
            label=np.array(d["label"], dtype=np.float64),
            node_ids=np.array([n[0] for n in nodes], dtype=np.int64),
            dists=np.array([n[1] for n in nodes], dtype=np.int64),
            feats=np.array([n[2] for n in nodes], dtype=np.float64).reshape(len(nodes), f_dim),
            e_src=np.array([e[0] for e in edges], dtype=np.int64),
            e_dst=np.array([e[1] for e in edges], dtype=np.int64),
            e_w=np.array([e[2] for e in edges], dtype=np.float64),
        )

    @classmethod
    def from_row(cls, row) -> "SubgraphRecord":
        """Decode a GraphFlat output Row (GF_SCHEMA) without JSON."""
        nodes = row["nodes"]
        edges = row["edges"]
        nodes = [] if nodes is None else list(nodes)
        edges = [] if edges is None else list(edges)
        f_dim = len(nodes[0]["feat"]) if nodes else 0
        label = row["label"]
        return cls(
            root=row["root"],
            label=np.array([] if label is None else list(label), dtype=np.float64),
            node_ids=np.array([n["id"] for n in nodes], dtype=np.int64),
            dists=np.array([n["dist"] for n in nodes], dtype=np.int64),
            feats=np.array([n["feat"] for n in nodes], dtype=np.float64).reshape(len(nodes), f_dim),
            e_src=np.array([e["src"] for e in edges], dtype=np.int64),
            e_dst=np.array([e["dst"] for e in edges], dtype=np.int64),
            e_w=np.array([e["w"] for e in edges], dtype=np.float64),
        )


def store_graph_features(gf: DataFrame, path: str) -> None:
    """Flatten each GraphFeature to its binary string form and write
    parquet — the pipeline's *Storing* phase (one flattened record per
    target, the paper's protobuf-string analog)."""

    def _flatten(iter_pdf):
        import pandas as pd  # noqa: PLC0415 — runs on executors

        for pdf in iter_pdf:
            recs = [
                SubgraphRecord.from_row(r).to_bytes()
                for r in pdf.to_dict("records")
            ]
            yield pd.DataFrame({"root": pdf["root"], "gf": recs})

    out_schema = T.StructType(
        [T.StructField("root", T.LongType()), T.StructField("gf", T.BinaryType())]
    )
    gf.mapInPandas(_flatten, schema=out_schema).write.mode("overwrite").parquet(path)


def load_graph_features(spark: SparkSession, path: str) -> DataFrame:
    """(root, gf: binary) DataFrame back from parquet."""
    return spark.read.parquet(path)


def collect_records(gf: DataFrame) -> list[SubgraphRecord]:
    """Materialise GraphFlat output as decoded records (driver side)."""
    return [SubgraphRecord.from_row(r) for r in gf.collect()]
