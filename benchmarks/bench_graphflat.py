"""GraphFlat benchmarks — K-hop GraphFeature generation cost by depth
and by sampling/re-indexing configuration (the pipeline behind Tables
4 & 5; the paper reports GraphFlat as a separate phase: 3.7 h of its
14 h training pipeline)."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.graphflat import build_graph_features, khop_members
from repro.core.sampling import sample_in_edges
from repro.experiments import make_datasets

N_TARGETS = 2000


@pytest.fixture(scope="module")
def uug(spark):
    ds = make_datasets("bench")["uug_lite"]
    nodes_df, edges_df = ds.to_spark(spark)
    nodes_df, edges_df = nodes_df.cache(), edges_df.cache()
    nodes_df.count(), edges_df.count()
    targets = spark.createDataFrame(
        pd.DataFrame({"id": ds.split_ids("train")[:N_TARGETS]})
    ).cache()
    targets.count()
    return ds, nodes_df, edges_df, targets


@pytest.mark.parametrize("k", [1, 2])
def test_khop_membership(benchmark, uug, k):
    _, _, edges_df, targets = uug
    benchmark.pedantic(
        lambda: khop_members(edges_df, targets, k).count(),
        rounds=2, iterations=1, warmup_rounds=1,
    )


@pytest.mark.parametrize("k", [1, 2])
def test_graphfeature_build(benchmark, uug, k):
    _, nodes_df, edges_df, targets = uug
    benchmark.pedantic(
        lambda: build_graph_features(
            nodes_df, edges_df, targets, k, max_degree=8
        ).count(),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("reindex", [None, 50], ids=["direct", "reindexed"])
def test_sampling(benchmark, uug, reindex):
    _, _, edges_df, _ = uug
    benchmark.pedantic(
        lambda: sample_in_edges(edges_df, 8, seed=1, reindex_threshold=reindex).count(),
        rounds=2, iterations=1, warmup_rounds=1,
    )
