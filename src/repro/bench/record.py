"""Record harness outputs produced during benchmark runs.

Each benchmark writes the paper-style formatted table both to stdout
(visible in ``bench_output.txt``) and to ``benchmarks/out/<name>.txt``
so EXPERIMENTS.md can reference exact measured numbers.
"""
from __future__ import annotations

import pathlib

OUT_DIR = pathlib.Path(__file__).resolve().parents[3] / "benchmarks" / "out"


def record(name: str, text: str) -> None:
    OUT_DIR.mkdir(parents=True, exist_ok=True)
    (OUT_DIR / f"{name}.txt").write_text(text + "\n")
    print(f"\n===== {name} =====\n{text}\n", flush=True)
