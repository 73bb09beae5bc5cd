"""T4–T5: adaptive execution (Fig. 8).

Usage: ``python jobs/fig8_adaptive.py [--quick]``. Prints the latency
timelines of (a) static vs adaptive under the selectivity spike and
(b) the MIR-store introduction scenario.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments.fig8 import render_timeline, scenario_a, scenario_b  # noqa: E402


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args(argv)
    spark = get_spark("fig8")

    if args.quick:
        a_kw = dict(rows_per_epoch=40, n_epochs=8, shift_epoch=3)
        b_kw = dict(r_rows_per_epoch=200, slow_rows_per_epoch=10, n_epochs=8,
                    shift_epoch=3)
    else:
        a_kw = dict(rows_per_epoch=60, n_epochs=12, shift_epoch=4)
        b_kw = dict(r_rows_per_epoch=400, slow_rows_per_epoch=15, n_epochs=12,
                    shift_epoch=4)

    print("## T4 — Fig 8a: static vs adaptive under a selectivity spike")
    static, adaptive = scenario_a(spark, **a_kw)
    print(render_timeline([static, adaptive]))
    print(
        f"static crashed: {static.run.crashed} (epoch {static.run.crash_epoch}); "
        f"adaptive crashed: {adaptive.run.crashed}; "
        f"adaptive reconfigured at epochs {[e for e, _ in adaptive.run.reconfigurations]}\n"
    )

    print("## T5 — Fig 8b: MIR-store introduction lowers latency")
    res = scenario_b(spark, **b_kw)
    print(render_timeline([res]))
    print(
        f"reconfigured at epochs {[e for e, _ in res.run.reconfigurations]}; "
        f"crashed: {res.run.crashed}"
    )
    return 0


if __name__ == "__main__":
    sys.exit(main())
