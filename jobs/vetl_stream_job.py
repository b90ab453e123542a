"""Run the adaptive V-ETL Structured Streaming job end to end.

Generates a few hours of COVID segment batches, fits the offline phase,
plans the knobs, and runs the streaming ingestion with adaptive
per-micro-batch knob switching; then queries the loaded warehouse.

Usage: spark-submit jobs/vetl_stream_job.py [--hours 2.0]
"""
from __future__ import annotations

import argparse
import os
import sys
import tempfile

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_session  # noqa: E402

from repro.core.fit import fit_skyscraper  # noqa: E402
from repro.core.planner import make_plan  # noqa: E402
from repro.etl.load import detections_per_class, ev_counts_per_hour  # noqa: E402
from repro.etl.streaming import run_streaming_job  # noqa: E402
from repro.sim.cluster import make_cluster  # noqa: E402
from repro.video.stream import write_stream_batches  # noqa: E402
from repro.workloads import get_workload  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--hours", type=float, default=2.0)
    ap.add_argument("--workdir", type=str, default=None)
    args = ap.parse_args()
    spark = get_session("vetl-stream")
    wl = get_workload("covid")
    workdir = args.workdir or tempfile.mkdtemp(prefix="vetl-")
    in_dir = os.path.join(workdir, "in")
    out_dir = os.path.join(workdir, "out")

    fitted = fit_skyscraper(wl, seed=0, train_days=2.0)
    cluster = make_cluster(8)
    plan = make_plan(
        fitted,
        fitted.train_hists,
        cluster,
        interval_s=args.hours * 3600.0,
        cloud_budget_usd=0.0,
    )
    write_stream_batches(
        spark, wl, in_dir, seed=0, n_days=args.hours / 24.0, start_day=2.0
    )
    switcher = run_streaming_job(
        spark, wl, fitted, plan.alpha, in_dir, out_dir, seed=0
    )
    print(f"processed {len(switcher.history)} micro-batches")
    det = spark.read.parquet(os.path.join(out_dir, "*.parquet"))
    print("detections:", det.count())
    ev_counts_per_hour(det).orderBy("hour").show()
    detections_per_class(det).orderBy("klass").show()
    spark.stop()


if __name__ == "__main__":
    main()
