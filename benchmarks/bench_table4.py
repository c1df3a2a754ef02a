"""Table 4 benchmarks — seconds per training epoch on ppi_lite.

Grid: {gcn, sage, gat} × {1,2,3} layers × {pyg_sim, dgl_sim, agl_base,
agl_pruning, agl_partition, agl_both}. One pytest-benchmark case per
cell; EXPERIMENTS.md records these against the paper's Table 4.

The shared module fixture runs GraphFlat once per depth (that cost is
the paper's GraphFlat phase, benchmarked separately in
``bench_graphflat.py``) and keeps the whole-graph batch in memory for
the comparator stand-ins.
"""
from __future__ import annotations

import pytest

from repro.experiments import AGL_VARIANTS, make_table4_trainer, prepare_table4

SCALE = "bench"
SYSTEMS = ["pyg_sim", "dgl_sim", *AGL_VARIANTS]
KINDS = ["gcn", "sage", "gat"]
LAYERS = [1, 2, 3]


@pytest.fixture(scope="module")
def setup(spark, tmp_path_factory):
    workdir = str(tmp_path_factory.mktemp("table4"))
    return prepare_table4(spark, workdir, scale=SCALE)


@pytest.mark.parametrize("system", SYSTEMS)
@pytest.mark.parametrize("layers", LAYERS)
@pytest.mark.parametrize("kind", KINDS)
def test_epoch_time(benchmark, setup, kind, layers, system):
    _, epoch_fn = make_table4_trainer(setup, system, kind, layers)
    benchmark.pedantic(epoch_fn, args=(0,), rounds=5, iterations=1, warmup_rounds=2)
