"""Shared helpers for the benchmark harnesses.

Each benchmark runs one experiment table once (``pedantic`` with a
single round — these are minutes-long sweeps, not microbenchmarks),
prints the rows the paper reports, persists them under
``benchmarks/results/`` (pytest's fd-level capture would otherwise
swallow them without ``-s``), and sanity-checks the qualitative shape
so a regression that flips who-wins fails loudly.
"""
from __future__ import annotations

import re
from pathlib import Path

from repro.experiments.harness import format_rows

RESULTS_DIR = Path(__file__).resolve().parent / "results"


def run_once(benchmark, fn):
    return benchmark.pedantic(fn, rounds=1, iterations=1)


def show(title: str, rows: list[dict], columns: list[str]) -> None:
    text = f"=== {title} ===\n{format_rows(rows, columns)}\n"
    print("\n" + text, flush=True)
    RESULTS_DIR.mkdir(exist_ok=True)
    slug = re.sub(r"[^a-z0-9]+", "_", title.lower()).strip("_")[:60]
    (RESULTS_DIR / f"{slug}.txt").write_text(text)


def pick(rows, **kv):
    out = [r for r in rows if all(r[k] == v for k, v in kv.items())]
    assert out, f"no row matching {kv}"
    return out
