"""Paper Table 2: single-core decode rate (images/s) per encoding.

Run: python jobs/table2_decode_rates.py [--sf=1.0]
"""
import _job
from repro.core.experiments import table2_decode_rates
from repro.core.harness import fmt_table

PAPER = """Paper Table 2 (images/s, single core):
| Dataset | Scan 1 | Scan 2 | Scan 5 | Scan 10 | Baseline |
|---|---|---|---|---|---|
| ImageNet | 433 | 412 | 340 | 146 | 419 |
| HAM10000 | 465 | 438 | 275 | 96 | 240 |
| Cars | 266 | 240 | 225 | 127 | 268 |
| CelebAHQ | 239 | 213 | 195 | 129 | 286 |"""


def run(spark) -> str:
    t = table2_decode_rates(spark, sf=_job.arg_sf())
    return (
        "# Table 2 — single-core decode rates (ours)\n\n"
        + fmt_table(t)
        + "\n\n"
        + PAPER
    )


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
