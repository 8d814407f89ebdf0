"""Shared SparkSession/bootstrap helpers for the spark-submit jobs.

Jobs mirror the pytest benchmarks (same drivers in `repro.experiments`)
but run standalone: ``spark-submit jobs/<name>.py [args]`` or plain
``python jobs/<name>.py [args]``. The session uses the same config as
conftest.py's fixture (broadcast joins disabled, Arrow on).
"""
from __future__ import annotations

import argparse
import json
import os
import tempfile

from pyspark.sql import SparkSession

from repro.experiments import profile_all
from repro.synth_data import write_tpcds


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def common_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--sf", type=float, default=0.05,
                   help="scale factor (sf=1 ~ 1 GB)")
    p.add_argument("--workdir", default=None,
                   help="scratch dir (default: a fresh temp dir)")
    p.add_argument("--out", default=None,
                   help="write the result table to this JSON path")
    return p


def prepare(spark, args, *, partitioned: bool = False):
    """Generate base tables and collect profiles; returns
    (base_paths, profiles, workdir)."""
    workdir = args.workdir or tempfile.mkdtemp(prefix="sc_job_")
    base = write_tpcds(
        spark, os.path.join(workdir, "base_p" if partitioned else "base"),
        sf=args.sf, partitioned=partitioned,
    )
    profiles = profile_all(
        spark, base, os.path.join(workdir, "prof_p" if partitioned else "prof"),
        partitioned=partitioned,
    )
    return base, profiles, workdir


def emit(args, obj) -> None:
    text = json.dumps(obj, indent=2, default=str)
    if args.out:
        with open(args.out, "w") as f:
            f.write(text)
        print(f"saved -> {args.out}")
    else:
        print(text)
