"""Fig 8: cumulative bytes per scan level (median + IQR) per dataset.

Run: python jobs/fig8_scan_sizes.py [--sf=1.0]
"""
import _job
from repro.core.experiments import fig8_scan_sizes
from repro.core.harness import fmt_table

PAPER = """Paper Fig 8: each scan adds roughly a constant amount of data (linear
scaling) with clustering from chroma scans; all 10 scans can need >10x
the bandwidth of scans 1-2."""


def run(spark) -> str:
    t = fig8_scan_sizes(spark, sf=_job.arg_sf())
    return "# Fig 8 — per-scan cumulative sizes (ours)\n\n" + fmt_table(t) + "\n\n" + PAPER


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
