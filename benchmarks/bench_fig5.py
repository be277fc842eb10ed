"""Benchmark for Fig 5: throughput prediction + event simulation."""
from repro.core.analysis import speedup_table
from repro.iosim.pipeline import simulate_training
from repro.iosim.storage import MiB


def test_bench_fig5_speedup_table(benchmark, bench_meta):
    t = benchmark(speedup_table, bench_meta, 4500.0, 10 * MiB)
    assert len(t) == 10


def test_bench_fig5_event_simulation(benchmark):
    res = benchmark(
        simulate_training, 400, 64, 110_000, 50 * MiB, 4500.0
    )
    assert res.total_time > 0
