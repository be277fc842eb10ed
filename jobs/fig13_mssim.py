"""Fig 13/23: MSSIM of each scan group vs full fidelity, per dataset.

Run: python jobs/fig13_mssim.py [--sf=1.0]
"""
import _job
from repro.core.experiments import fig13_mssim
from repro.core.harness import fmt_table

PAPER = """Paper Fig 13/23: MSSIM decreases for lower scans; scan groups >= 5 sit
above ~0.95 MSSIM, which is why they consistently reach full accuracy;
MSSIM correlates linearly with final test accuracy within a task."""


def run(spark) -> str:
    t = fig13_mssim(spark, sf=_job.arg_sf())
    return "# Fig 13/23 — MSSIM per scan group (ours)\n\n" + fmt_table(t) + "\n\n" + PAPER


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
