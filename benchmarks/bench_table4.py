"""Benchmark: Table IV permutation importance over the fold models."""
import pytest

from benchmarks._config import BENCH_K, BENCH_N_MATCHERS, BENCH_N_PERM, BENCH_NN, BENCH_GRID


@pytest.fixture(scope="module")
def exp(spark):
    from repro.experiments import run_po_experiment

    return run_po_experiment(
        spark, n_matchers=BENCH_N_MATCHERS, k=BENCH_K, seed=0,
        nn=BENCH_NN, n_perm=BENCH_N_PERM, grid=BENCH_GRID,
    )


@pytest.mark.benchmark(group="table4")
def test_table4_importance(benchmark, exp):
    from repro.experiments import table4

    result = benchmark.pedantic(lambda: table4(exp, n_rep=3), rounds=1, iterations=1)
    assert {"set", "label", "rank", "feature"} <= set(result.columns)
