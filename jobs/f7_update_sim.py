"""Table 2 + Figure 7 — the 100-day real-world update simulation.

Runs Workload A (SPACEV-like, shifting) and Workload B (SIFT-like,
uniform) through DiskANN / SPANN+ / SPFresh and prints the per-epoch
time series, the per-system summary, and the LIRE §5.2.2 statistics.
"""
import pandas as pd

from repro.experiments import THREADS_TABLE2, run_f7_update_sim, summarize_f7
from repro.harness import render_table


def main() -> None:
    print("== Table 2: thread allocation used by the harness models ==")
    print(render_table(THREADS_TABLE2))
    for kind, label in (("spacev", "Workload A (SPACEV-like)"), ("sift", "Workload B (SIFT-like)")):
        series, lire = run_f7_update_sim(
            kind=kind, n_base=8_000, n_epochs=60, n_queries=400, measure_every=3,
            merge_every_frac=0.25,
        )
        print(f"\n== Figure 7 — {label}: summary ==")
        print(render_table(summarize_f7(series)))
        print(f"\n== Figure 7 — {label}: per-epoch time series ==")
        for name, ts in series.items():
            print(f"-- {name} --")
            print(render_table(ts[["epoch", "recall", "p50_ms", "p99_ms", "p999_ms", "insert_avg_ms", "mem_mb"]]))
        if lire:
            print(f"\n== LIRE statistics (§5.2.2), {label} ==")
            print(render_table(pd.DataFrame([lire])))


if __name__ == "__main__":
    main()
