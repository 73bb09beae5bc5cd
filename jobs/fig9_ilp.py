"""T6–T10: ILP optimization experiments (Fig. 9 and the §V-2 example).

Usage: ``python jobs/fig9_ilp.py [--quick]``. Pure driver-side — no
SparkSession needed (the ILP experiments simulate the environment, as
in the paper).
"""
import argparse
import sys

from repro.core.cost import Statistics
from repro.core.optimizer import individual_cost, optimize_independent, optimize_mqo
from repro.core.query import Query, pred
from repro.experiments.fig9 import (
    probe_cost_experiment,
    render_cost_table,
    render_runtime_table,
    runtime_experiment,
)


def worked_example() -> str:
    """T10 — §V-2 worked example: individual 950 vs shared optimum."""
    q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
    q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
    stats = Statistics(
        rates={r: 100.0 for r in "RSTU"},
        selectivities={
            pred("R", "a", "S", "a"): 0.01,
            pred("S", "b", "T", "b"): 0.015,
            pred("T", "c", "U", "c"): 0.01,
        },
    )
    ind = individual_cost(optimize_independent([q1, q2], stats, use_mirs=False))
    mqo = optimize_mqo([q1, q2], stats, use_mirs=False)
    return (
        f"§V-2 worked example: individual = {ind:.0f} (paper: 950), "
        f"MQO = {mqo.objective:.0f} (paper narrative: 875; exact optimum shares "
        f"both the ⟨S,T⟩ and ⟨T,S⟩ prefixes)"
    )


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true", help="small sweep for smoke runs")
    args = ap.parse_args(argv)

    print("## T10 —", worked_example(), "\n")

    if args.quick:
        nq_small, nq_big = (5, 10), (5, 10)
        tl, configs = 10.0, ((3, 5), (4, 3))
    else:
        nq_small = (5, 10, 20, 50, 100)
        nq_big = (5, 10, 20, 50)
        tl = 60.0
        configs = ((3, 10), (3, 50), (3, 100), (4, 10), (5, 10), (5, 30))

    print("## T6 — Fig 9a/9b: probe cost & problem size, 10 input relations")
    rows = probe_cost_experiment(
        n_relations=10, n_query_list=nq_small, time_limit=tl
    )
    print(render_cost_table(rows), "\n")

    print("## T7 — Fig 9c/9d: probe cost & problem size, 100 input relations")
    rows = probe_cost_experiment(
        n_relations=100, n_query_list=nq_big, time_limit=tl
    )
    print(render_cost_table(rows), "\n")

    print("## T8/T9 — Fig 9e/9f: optimization runtime vs n_Q and query size")
    rows = runtime_experiment(configs=configs, time_limit=2 * tl)
    print(render_runtime_table(rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())
