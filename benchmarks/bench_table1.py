"""Benchmark: Table I — generating the experiment graphs and computing
their statistics at each G-lite scale (one benchmark per rung)."""
import pytest

from repro.bench.tables import PAPER_TABLE1
from repro.tpg.generator import G_LITE, g_lite

RUNGS = ("G1", "G2", "G3", "G4", "G5", "G6", "G10")


@pytest.mark.parametrize("name", RUNGS)
def test_table1_generate(benchmark, name):
    stats = benchmark.pedantic(
        lambda: g_lite(name).stats(), rounds=1, iterations=1
    )
    assert stats["nodes"] >= G_LITE[name]
    assert name in PAPER_TABLE1
