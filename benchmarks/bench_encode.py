"""Benchmark for Fig 22: PCR conversion path (encode + transcode + pack)."""
import os

from repro.core import pcr
from repro.jpeg import baseline_to_progressive, encode_baseline
from repro.synth_images import SPECS, generate_image


def _images(n=4):
    spec = SPECS["celeba_lite"]
    return [generate_image(spec, i)[0] for i in range(n)], spec.quality


def test_bench_encode_baseline(benchmark):
    imgs, q = _images()
    benchmark(lambda: [encode_baseline(im, q) for im in imgs])


def test_bench_transcode_progressive(benchmark):
    imgs, q = _images()
    base = [encode_baseline(im, q) for im in imgs]
    benchmark(lambda: [baseline_to_progressive(b) for b in base])


def test_bench_pcr_pack(benchmark, tmp_path):
    imgs, q = _images()
    progs = [baseline_to_progressive(encode_baseline(im, q)) for im in imgs]
    items = [(p, i) for i, p in enumerate(progs)]
    path = str(tmp_path / "r.pcr")

    def run():
        pcr.write_pcr(path, items)

    benchmark(run)
    assert os.path.getsize(path) > 0
