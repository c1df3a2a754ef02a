"""Table 3 — effectiveness (accuracy / micro-F1 / AUC) of GCN,
GraphSAGE and GAT trained with the PyG/DGL stand-ins vs the AGL path
(GraphFlat → GraphTrainer). PyG/DGL columns are omitted on uug_lite,
as in the paper (OOM on UUG there)."""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import job_main  # noqa: E402

from repro.experiments import TABLE3_PAPER, print_table, table3_run  # noqa: E402


def run(spark, scale: str = "bench") -> list[dict]:
    rows = table3_run(spark, scale=scale)
    print_table(rows, f"Table 3 (measured, scale={scale}): effectiveness")
    paper = [
        {"dataset": d, "model": m, **v} for (d, m), v in TABLE3_PAPER.items()
    ]
    print_table(paper, "Table 3 (paper): effectiveness")
    return rows


if __name__ == "__main__":
    job_main(run)
