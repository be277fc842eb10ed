"""Benchmark for Table 3: dataset summary (Spark agg + quality estimate)."""
from repro.core.dataset import dataset_summary


def test_bench_table3_summary(benchmark, spark, bench_dir):
    row = benchmark(dataset_summary, spark, bench_dir, "celeba_lite")
    assert row["classes"] == 2
