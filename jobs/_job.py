"""Shared entrypoint plumbing for spark-submit jobs.

Each job module defines ``run(spark) -> str`` (a markdown report) and
calls ``main(run)`` under ``__main__``. Usage:
    spark-submit jobs/<name>.py   (or: python jobs/<name>.py)
"""
import sys


def main(run_fn):
    from repro.core.harness import job_spark

    spark = job_spark(run_fn.__module__)
    spark.sparkContext.setLogLevel("ERROR")
    try:
        print(run_fn(spark))
    finally:
        spark.stop()
    return 0


def arg_sf(default=1.0):
    for a in sys.argv[1:]:
        if a.startswith("--sf="):
            return float(a.split("=", 1)[1])
    return default
