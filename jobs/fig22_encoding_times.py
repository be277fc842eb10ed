"""Fig 22/§A.4: PCR conversion cost vs static multi-quality re-encoding.

Run: python jobs/fig22_encoding_times.py [--sf=1.0]
"""
import _job
from repro.core.experiments import fig22_encoding_times
from repro.core.harness import fmt_table

PAPER = """Paper Fig 22/§A.4: one PCR conversion costs 1.13-2.05x a single
static re-encode, but static needs one encode per quality level (costs
sum) and amplifies dataset size 1.5-40x; PCR keeps one copy (~no
amplification)."""


def run(spark) -> str:
    t = fig22_encoding_times(spark, sf=_job.arg_sf())
    return "# Fig 22 — encoding time & space (ours)\n\n" + fmt_table(t) + "\n\n" + PAPER


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
