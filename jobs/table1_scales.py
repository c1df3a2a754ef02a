"""Table 1 — graph scales reported by different GML systems.

A literature table in the paper (no experiment); reproduced verbatim so
EXPERIMENTS.md can reference a single source of truth.
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import job_main  # noqa: E402

from repro.experiments import TABLE1_ROWS, print_table  # noqa: E402


def run(spark=None, scale: str = "bench") -> list[dict]:
    rows = [
        {
            "system": name,
            "nodes": f"{n:.2e}",
            "edges": "unknown" if e is None else f"{e:.2e}",
        }
        for name, n, e in TABLE1_ROWS
    ]
    print_table(rows, "Table 1: graph scale reported by different GML systems")
    return rows


if __name__ == "__main__":
    job_main(run)
