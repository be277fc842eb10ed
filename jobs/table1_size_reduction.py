"""Paper Table 1: image size reduction per scan group + mean image size.

Run: python jobs/table1_size_reduction.py [--sf=1.0]
"""
import _job
from repro.core.experiments import table1_size_reduction
from repro.core.harness import fmt_table

PAPER = """Paper Table 1 (reduction factor vs full fidelity):
| Dataset | Scan 1 | Scan 2 | Scan 5 | Scan 10 | mean size |
|---|---|---|---|---|---|
| ImageNet | 16x | 7x | 2x | 1x | 110kB |
| HAM10000 | 30x | 15x | 3x | 1x | 250kB |
| Cars | 14x | 6x | 2x | 1x | 110kB |
| CelebAHQ | 7x | 4x | 3x | 1x | 80kB |"""


def run(spark) -> str:
    t = table1_size_reduction(spark, sf=_job.arg_sf())
    return (
        "# Table 1 — size reduction per scan group (ours)\n\n"
        + fmt_table(t)
        + "\n\n"
        + PAPER
    )


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
