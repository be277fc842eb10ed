"""Paper Table 3: dataset/record summary (records, images, size, quality).

Run: python jobs/table3_dataset_summary.py [--sf=1.0]
"""
import _job
from repro.core.experiments import table3_dataset_summary
from repro.core.harness import fmt_table

PAPER = """Paper Table 3:
| Dataset | Records | Images | Size | Quality | Classes |
|---|---|---|---|---|---|
| ImageNet | 1251 | 1281167 | 129GiB | 91.7% | 1000 |
| HAM10000 | 125 | 8012 | 2GiB | 100% | 7 |
| Cars | 63 | 8144 | 887MiB | 83.8% | 196 |
| CelebAHQ | 93 | 24000 | 2GiB | 75% | 2 |"""


def run(spark) -> str:
    t = table3_dataset_summary(spark, sf=_job.arg_sf())
    return (
        "# Table 3 — PCR dataset summary (ours)\n\n"
        + fmt_table(t)
        + "\n\n"
        + PAPER
    )


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
