"""pytest-benchmark targets — one per paper table.

Each benchmark runs the corresponding table harness at a reduced-but-
representative size (the paper uses 1000 series per config; see
DESIGN.md §5) and also prints the resulting table so `bench_output.txt`
doubles as the raw record behind EXPERIMENTS.md.  Detection work is
Spark-parallel, so the benchmark time is end-to-end wall clock of the
whole table job.
"""
import pytest

from repro.experiments import tables

N_SERIES = 20          # per synthetic config
N_YAHOO = 10
N_CRAN = 40


def _run(benchmark, fn):
    result = benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)
    print()
    print(result.to_string())
    return result


@pytest.mark.benchmark(group="table1")
def test_bench_table1(benchmark, spark):
    _run(benchmark, lambda: tables.table1(spark, n_series=N_SERIES,
                                          n_cran=N_CRAN))


@pytest.mark.benchmark(group="table2")
def test_bench_table2(benchmark, spark):
    _run(benchmark, lambda: tables.table2(spark, n_series=N_SERIES,
                                          n_yahoo=N_YAHOO))


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark, spark):
    _run(benchmark, lambda: tables.table3(spark, n_series=N_SERIES))


@pytest.mark.benchmark(group="table4")
def test_bench_table4(benchmark, spark):
    _run(benchmark, lambda: tables.table4(spark))


@pytest.mark.benchmark(group="table5")
def test_bench_table5(benchmark, spark):
    _run(benchmark, lambda: tables.table5(spark, n_series=N_SERIES))


@pytest.mark.benchmark(group="table6")
def test_bench_table6(benchmark, spark):
    _run(benchmark, lambda: tables.table6(spark, n_series=8))


@pytest.mark.benchmark(group="table78")
def test_bench_table78(benchmark, spark):
    def run():
        timing, f1 = tables.table78(spark, n_series=10)
        return timing.join(f1, lsuffix="_time_s", rsuffix="_f1")
    _run(benchmark, run)
