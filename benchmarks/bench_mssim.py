"""Benchmark for Fig 13: MSSIM of a truncated scan vs full fidelity."""
from repro.core import pcr
from repro.core.dataset import record_paths
from repro.jpeg import decode
from repro.metrics.mssim import msssim


def test_bench_mssim_pair(benchmark, bench_dir):
    path = record_paths(bench_dir)[0]
    low = decode(pcr.read_pcr(path, 2)[0][1])
    full = decode(pcr.read_pcr(path, 10)[0][1])
    score = benchmark(msssim, low, full)
    assert 0.0 < score < 1.0
