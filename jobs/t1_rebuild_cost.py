"""Table 1 — global rebuild costs vs SPFresh incremental cost.

Usage: spark-submit jobs/t1_rebuild_cost.py  (or plain python; this
experiment is driver-side — the rebuild under test is the substrate
simulator, not a Spark job).
"""
from repro.experiments import run_t1_rebuild_cost
from repro.harness import render_table


def main() -> None:
    df = run_t1_rebuild_cost(n_base=10_000)
    print("== Table 1 (scaled): global rebuild vs incremental ==")
    print(render_table(df))


if __name__ == "__main__":
    main()
