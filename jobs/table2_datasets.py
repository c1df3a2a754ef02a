"""Table 2 — dataset summary: our synthetic stand-ins vs the paper's
Cora / PPI / UUG (sizes, feature dims, classes, split sizes)."""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import job_main  # noqa: E402

from repro.experiments import TABLE2_PAPER, print_table, table2_rows  # noqa: E402


def run(spark=None, scale: str = "bench") -> list[dict]:
    rows = table2_rows(scale)
    print_table(rows, f"Table 2 (measured, scale={scale}): dataset summary")
    paper = [{"dataset": k, **v} for k, v in TABLE2_PAPER.items()]
    print_table(paper, "Table 2 (paper): dataset summary")
    return rows


if __name__ == "__main__":
    job_main(run)
