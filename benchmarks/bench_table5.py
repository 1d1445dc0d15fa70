"""Benchmark for Table 5: memory accounting across algorithms, with the
paper's ordering asserted (sofa's state is orders of magnitude below the
static baselines') and the wiki/basso out-of-budget cell."""
import math

import pytest

from repro.eval import harness


@pytest.mark.benchmark(group="table5")
def test_memory_accounting_ordering(benchmark, spark):
    def run():
        harness.clear_pass_cache()
        sofa = harness.run_cell(spark, "book", "sofa", 8)
        basso = harness.run_cell(None, "book", "basso", 8)
        rs = harness.run_cell(None, "book", "rs-dhillon", 8)
        return sofa, basso, rs

    sofa, basso, rs = benchmark.pedantic(run, rounds=1, iterations=1)
    # Table 5's claim: sofa uses a small fraction of the baselines' memory
    assert sofa.memory_bytes * 10 < basso.memory_bytes
    assert sofa.memory_bytes * 10 < rs.memory_bytes


@pytest.mark.benchmark(group="table5")
def test_memory_wiki_basso_oom(benchmark):
    def run():
        return harness.run_cell(None, "wiki", "basso", 8)

    cell = benchmark.pedantic(run, rounds=1, iterations=1)
    assert cell.note == "oom"
    assert math.isnan(cell.gain)
