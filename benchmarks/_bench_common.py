"""Shared helpers for the per-table benchmarks.

Each ``bench_tableN.py``:

1. regenerates paper Table N at bench scale through the harness (the
   heavy per-dataset evaluation is cached in ``repro.harness.tables``,
   so the eight benchmarks share one evaluation pass);
2. prints the paper-vs-measured rows straight to the real stdout
   (bypassing pytest capture so they land in bench_output.txt) and
   writes them under ``results/``;
3. times one representative kernel of that table with pytest-benchmark.
"""
from __future__ import annotations

import pathlib
import sys

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


def publish(text: str, fname: str, cap=None) -> None:
    """Print past pytest's capture and persist under results/.

    ``cap`` is the test's ``capfd`` fixture: pytest captures at the file-
    descriptor level, so even ``sys.__stdout__`` is swallowed unless
    capture is suspended — this is what puts the tables into
    ``bench_output.txt``.
    """
    if cap is not None:
        with cap.disabled():
            print(text, flush=True)
    else:
        print(text, file=sys.__stdout__, flush=True)
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / fname).write_text(text)
