"""Benchmark for Table 3's workload: dataset generation + Spark statistics."""
import pytest

from repro.datasets import load_preset
from repro.datasets.stats import stats_row


@pytest.fixture(scope="module")
def grab1():
    return load_preset("grab1_lite", scale=0.1)


def test_bench_generate_grab1(benchmark):
    benchmark.pedantic(
        lambda: load_preset("grab1_lite", scale=0.1), rounds=3, iterations=1
    )


def test_bench_table3_stats(spark, grab1, benchmark):
    benchmark.pedantic(lambda: stats_row(spark, grab1), rounds=3, iterations=1)
