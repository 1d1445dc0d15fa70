"""Benchmark for Table 4: run-time comparison — sofa (streaming) vs
basso (static) vs the RS reduction on the same dataset/k. The relative
ordering (basso slowest on large/sparse data) is Table 4's claim."""
import pytest

from repro.eval import harness


@pytest.mark.benchmark(group="table4")
def test_runtime_sofa_flickr(benchmark, spark):
    def run():
        harness.clear_pass_cache()
        return harness.run_cell(spark, "flickr", "sofa", 8)

    cell = benchmark.pedantic(run, rounds=1, iterations=1)
    assert cell.ok


@pytest.mark.benchmark(group="table4")
def test_runtime_basso_flickr(benchmark):
    def run():
        return harness.run_cell(None, "flickr", "basso", 8)

    cell = benchmark.pedantic(run, rounds=1, iterations=1)
    assert cell.ok


@pytest.mark.benchmark(group="table4")
def test_runtime_rs_dhillon_flickr(benchmark):
    def run():
        return harness.run_cell(None, "flickr", "rs-dhillon", 8)

    cell = benchmark.pedantic(run, rounds=1, iterations=1)
    assert cell.ok
