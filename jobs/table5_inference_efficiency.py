"""Table 5 — inference efficiency over the whole uug_lite graph:
Original (GraphFlat + per-GraphFeature forward, recomputing overlaps)
vs GraphInfer (K+1 slice-wise MapReduce rounds), 2-layer GAT, 8-dim
embeddings. Reports wall time + deterministic compute-cost proxies."""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import job_main  # noqa: E402

from repro.experiments import TABLE5_PAPER, print_table, table5_run  # noqa: E402


def run(spark, scale: str = "bench", workdir: str = "/tmp/agl_table5") -> dict:
    res = table5_run(spark, workdir, scale=scale)
    print_table([res], f"Table 5 (measured, scale={scale}): inference efficiency")
    print_table([TABLE5_PAPER], "Table 5 (paper): inference efficiency on UUG")
    return res


if __name__ == "__main__":
    job_main(run, needs_workdir=True)
