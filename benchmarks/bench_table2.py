"""Benchmark for Table 2: the full sofa pipeline (distributed first pass
+ theta line-search + pruned BMF second pass) producing Hamming gain."""
import pytest

from repro.eval import harness


@pytest.mark.benchmark(group="table2")
@pytest.mark.parametrize("dataset", ["reuters", "movie"])
def test_sofa_gain_pipeline(benchmark, spark, dataset):
    def run():
        harness.clear_pass_cache()
        return harness.run_cell(spark, dataset, "sofa", 8)

    cell = benchmark.pedantic(run, rounds=1, iterations=1)
    assert cell.ok
    assert cell.gain > 0
