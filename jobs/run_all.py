"""Run every table/figure job and print one combined report.

Run: python jobs/run_all.py [--sf=1.0]
The output of this job is the source of the "ours" numbers recorded in
EXPERIMENTS.md.
"""
import _job
import fig5_throughput
import fig6_gradsim
import fig7_time_to_accuracy
import fig8_scan_sizes
import fig13_mssim
import fig14_autotune
import fig16_bandwidth_sweep
import fig22_encoding_times
import fig24_reader
import table1_size_reduction
import table2_decode_rates
import table3_dataset_summary

JOBS = [
    table1_size_reduction,
    table2_decode_rates,
    table3_dataset_summary,
    fig5_throughput,
    fig8_scan_sizes,
    fig13_mssim,
    fig7_time_to_accuracy,
    fig6_gradsim,
    fig14_autotune,
    fig16_bandwidth_sweep,
    fig22_encoding_times,
    fig24_reader,
]


def run(spark) -> str:
    return "\n\n---\n\n".join(j.run(spark) for j in JOBS)


if __name__ == "__main__":
    raise SystemExit(_job.main(run))
