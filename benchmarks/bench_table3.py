"""Benchmark: Table III ablation (classifier refits over a shared
transform stage — the network-reuse fast path)."""
import pytest

from benchmarks._config import BENCH_K, BENCH_N_MATCHERS, BENCH_N_PERM, BENCH_NN, BENCH_GRID


@pytest.fixture(scope="module")
def exp(spark):
    from repro.experiments import run_po_experiment

    return run_po_experiment(
        spark, n_matchers=BENCH_N_MATCHERS, k=BENCH_K, seed=0,
        nn=BENCH_NN, n_perm=BENCH_N_PERM, grid=BENCH_GRID,
    )


@pytest.mark.benchmark(group="table3")
def test_table3_ablation(benchmark, exp):
    from repro.experiments import table3

    result = benchmark.pedantic(lambda: table3(exp), rounds=1, iterations=1)
    assert len(result) == 11  # MExI_50 + 5 include + 5 exclude
