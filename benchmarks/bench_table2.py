"""Benchmark: Table II — Q1–Q12 on the largest G-lite graph via the
interval evaluator (one benchmark per query row of the table).

Each benchmark measures the full pipeline the paper's "total time" column
reports: Steps 1–2 (interval evaluation) plus Step 3 (point expansion, or
output coalescing for the structural-only queries Q1–Q5). The measured
rows, next to the paper's, are recorded in EXPERIMENTS.md.
"""
import pytest

from repro.bench.tables import PAPER_TABLE2, run_query_interval
from repro.tpg.generator import g_lite
from repro.tpg.model import SparkITPG
from repro.trpq import queries as Q
from repro.trpq.interval_eval import IntervalEvaluator

GRAPH = "G10"


@pytest.fixture(scope="module")
def interval_ev(spark):
    data = g_lite(GRAPH)
    return IntervalEvaluator(SparkITPG.from_data(spark, data))


@pytest.mark.parametrize("name", Q.TABLE2)
def test_table2_query(benchmark, interval_ev, name):
    q = Q.query(name)
    coalesced = name in Q.STRUCTURAL_ONLY

    def run():
        return run_query_interval(interval_ev, q, coalesced_output=coalesced)

    result = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    assert result["interval_s"] <= result["total_s"]
    assert result["output"] >= 0
    benchmark.extra_info["output_size"] = result["output"]
    benchmark.extra_info["interval_s"] = round(result["interval_s"], 3)
    benchmark.extra_info["paper"] = PAPER_TABLE2[name]
