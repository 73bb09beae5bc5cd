"""T1–T3: multi-query performance on TPC-H-lite (Fig. 7).

Usage: ``python jobs/fig7_multiquery.py [--sf 0.01] [--quick]``.
Compares independent (FI/SI), shared (FS/SS) and CLASH-MQO execution of
the 5-query and 10-query workloads through the Spark micro-batch engine:
throughput, probe messages, peak stored state and modeled latency.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments.fig7 import multi_query_experiment, render_table  # noqa: E402
from repro.workloads.tpch_queries import fig7_workload_5, fig7_workload_10  # noqa: E402


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.01)
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args(argv)
    spark = get_spark("fig7")

    sf = 0.003 if args.quick else args.sf
    epoch = 5.0 if args.quick else 2.0

    for label, queries in (
        ("5 queries", fig7_workload_5()),
        ("10 queries", fig7_workload_10()),
    ):
        if args.quick and label == "10 queries":
            continue
        print(f"## T1–T3 — Fig 7: {label}, SF={sf}")
        rows = multi_query_experiment(
            spark, queries, sf=sf, epoch=epoch, duration=10.0
        )
        print(render_table(rows))
        ind = next(r for r in rows if r.strategy == "independent")
        sh = next(r for r in rows if r.strategy == "shared")
        mq = next(r for r in rows if r.strategy == "mqo")
        print(
            f"speedup shared vs independent: {sh.throughput / ind.throughput:.2f}× "
            f"(paper ~1.4×); mqo vs independent: {mq.throughput / ind.throughput:.2f}× "
            f"(paper ~2.6×)"
        )
        print(
            f"memory independent vs shared: {ind.peak_state / max(1, sh.peak_state):.2f}× "
            f"(paper: 3.1× at 5 queries, 5.3× at 10)"
        )
        if mq.mean_latency_ms and sh.mean_latency_ms:
            print(
                f"latency mqo vs shared: "
                f"{mq.mean_latency_ms / sh.mean_latency_ms - 1:+.1%} "
                f"(paper: +14–16%)\n"
            )
    return 0


if __name__ == "__main__":
    sys.exit(main())
