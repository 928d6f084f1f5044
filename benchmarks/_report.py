"""Shared reporting helper for the table benchmarks.

Each benchmark prints its paper-vs-measured table to stdout AND writes
it to ``benchmarks/results/tableN.md`` so the numbers survive pytest's
output capture and can be diffed against EXPERIMENTS.md.
"""
from __future__ import annotations

import pathlib

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


def report(table_name: str, text: str) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{table_name}.md").write_text(text)
    print(f"\n===== {table_name} =====\n{text}")
