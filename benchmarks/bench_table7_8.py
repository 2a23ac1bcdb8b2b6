"""Tables 7/8 benchmark: Jacobson (c, m) sensitivity; §8.5 scheme
comparison; Fig 12 k sweep as a table."""
import pytest

from repro.bench.record import record
from repro.bench.sensitivity import (
    k_sweep,
    table7,
    table7_extremes,
    table8,
)
from repro.graphs.datasets import wiki_like


def test_table7_cm_runtime(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table7(sf=0.5, repeats=5), rounds=1, iterations=1
    )
    piv = df.pivot_table(index="rho", columns=["c", "m"], values="ms")
    record(
        "table7",
        "Table 7 — 1-hop read runtime (ms) per (c, m) and non-NULL rho\n"
        + piv.round(2).to_string(),
    )
    # Shape: runtime is insensitive to (c, m). We check spread away from
    # the extremes (rho=100 hits the dense fast path that skips ranks
    # entirely; sub-ms cells at tiny rho are noise-dominated).
    mid = df[(df.rho >= 20) & (df.rho <= 90)]
    for rho, grp in mid.groupby("rho"):
        assert grp["ms"].max() / grp["ms"].min() < 4.0, rho
    # No blow-up with sparsity either.
    assert df[df.rho == 20]["ms"].median() < df[df.rho == 90]["ms"].median() * 3


def test_table7_scheme_extremes(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table7_extremes(sf=0.2), rounds=1, iterations=1
    )
    record("table7_schemes", df.round(2).to_string())
    # Paper §8.5: Vanilla-NULL is >20x slower than J-NULL.
    assert df.loc["Vanilla-NULL", "ms"] > 20 * df.loc["J-NULL", "ms"]


def test_table8_cm_memory(benchmark, spark):
    df = benchmark.pedantic(lambda: table8(sf=0.2), rounds=1, iterations=1)
    record(
        "table8",
        "Table 8 — overhead of bit strings + prefix sums per (c, m)\n"
        + df.round(3).to_string(index=False),
    )
    d = df.set_index(["c", "m"])["overhead_bytes"]
    # Paper Table 8 shape: overhead ~ m/c; (8,8) ≈ (16,16); max at (8,32).
    assert abs(d[(8, 8)] - d[(16, 16)]) / d[(16, 16)] < 0.3
    assert d[(8, 32)] == d.max()
    assert d[(16, 8)] == d.min()


def test_fig12_k_sweep(benchmark, spark):
    data = wiki_like(sf=2.0)
    df = benchmark.pedantic(
        lambda: k_sweep(data, ks=(2, 8, 32, 128, 512, 2048), repeats=2),
        rounds=1,
        iterations=1,
    )
    record("fig12_k_sweep", df.to_string(index=False))
    # Shape: k=128 is no slower than pure edge columns ('*').
    t = dict(zip(df["k"], df["seconds"]))
    assert t["128"] < t["*"]
