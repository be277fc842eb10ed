"""Figs 7/9/10/11: time-to-accuracy per scan group, model, and task.

Covers: per-dataset accuracy/time tables for both model profiles, plus
the Cars label-coarsening experiment (Fig 11: Baseline / Make-Only /
Is-Corvette).

Run: python jobs/fig7_time_to_accuracy.py [--sf=1.0]
"""
import _job
from repro.core.harness import fmt_table
from repro.train.experiments import fig7_time_to_accuracy

PAPER = """Paper Figs 7/9/10/11: lower scans cut time-to-accuracy up to ~2x;
scans 1-2 may cost final accuracy on hard tasks (ImageNet) but not easy
ones (CelebA binary); ShuffleNet needs scan >= 5 on HAM10000 while
ResNet tolerates scan 1; coarsening Cars labels closes the scan gap."""


def run(spark) -> str:
    sf = _job.arg_sf()
    parts = []
    for ds in ("imagenet_lite", "ham_lite", "celeba_lite"):
        t = fig7_time_to_accuracy(spark, ds, sf=sf)
        parts.append(f"## {ds}\n\n" + fmt_table(t))
    for label_col, title in (
        ("label", "cars_lite baseline task"),
        ("make", "cars_lite make-only"),
        ("is_zero", "cars_lite is-corvette (binary)"),
    ):
        t = fig7_time_to_accuracy(
            spark, "cars_lite", sf=sf, models=("resnet_lite",), label_col=label_col
        )
        parts.append(f"## {title}\n\n" + fmt_table(t))
    return "# Figs 7/9/10/11 — time to accuracy (ours)\n\n" + "\n\n".join(parts) + "\n\n" + PAPER


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
