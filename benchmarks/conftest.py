"""Benchmark fixtures: one shared TableContext at bench scale.

The context memoizes datasets, signal bundles, learned weights and JOCL
runs across the per-table benchmarks — exactly how one evaluation run
of the paper feeds several tables.  Scale comes from ``REPRO_BENCH_SF``
(default 0.03 ≈ 1 350 ReVerb-lite triples).
"""
from __future__ import annotations

import pathlib

import pytest

from repro.tables.common import BENCH_SF, TableContext

OUT_DIR = pathlib.Path(__file__).parent / "out"


@pytest.fixture(scope="session")
def ctx(spark) -> TableContext:
    from repro.core.jocl import JOCLConfig

    # bench config: 10 LBP iterations at inference, 2 learning epochs
    # with 4-iteration inner LBP — converged enough at bench scale while
    # keeping the six-table sweep under an hour on 16 cores
    return TableContext(
        spark, sf=BENCH_SF,
        base_config=JOCLConfig(lbp_iters=10, learn_lbp_iters=4, epochs=2),
    )


@pytest.fixture(scope="session")
def out_dir() -> pathlib.Path:
    OUT_DIR.mkdir(exist_ok=True)
    return OUT_DIR


def check_and_save(rows, render, out_dir, name, value_cols):
    """Common post-bench assertions + artifact dump."""
    assert rows, f"{name}: no rows produced"
    for r in rows:
        for c in value_cols:
            v = r.get(c)
            if isinstance(v, (int, float)):
                assert 0.0 <= v <= 1.0, f"{name}: {c}={v} out of range"
    text = render(rows)
    (out_dir / f"{name}.txt").write_text(text + "\n")
    print("\n" + text)
    return rows
