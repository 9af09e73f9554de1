"""Benchmark helpers: run each table harness once under pytest-benchmark
and persist the rendered paper-vs-measured block to benchmarks/results/.
"""
from __future__ import annotations

from pathlib import Path

RESULTS = Path(__file__).resolve().parent / "results"


def save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / f"{name}.txt").write_text(text + "\n")
    print("\n" + text)


def run_once(benchmark, fn):
    """One measured invocation — table harnesses are minutes-scale, so
    pytest-benchmark's default multi-round statistics are pointless."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)
