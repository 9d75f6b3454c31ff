"""Benchmark for Table 2 + Figure 7 — the real-world update simulation."""
import pandas as pd

from repro.experiments import THREADS_TABLE2, run_f7_update_sim, summarize_f7
from repro.harness import render_table


def test_f7_update_sim(benchmark):
    series, lire = benchmark.pedantic(
        lambda: run_f7_update_sim(
            kind="spacev", n_base=3_000, n_epochs=30, n_queries=200, measure_every=3,
            merge_every_frac=0.25,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + render_table(THREADS_TABLE2))
    summary = summarize_f7(series).set_index("system")
    print(render_table(summary.reset_index()))
    print(render_table(pd.DataFrame([lire])))
    # Paper shapes (Fig. 7): SPFresh has the lowest and most stable tail;
    # DiskANN's tail spikes during merges; SPANN+'s tail drifts upward.
    assert summary.loc["SPFresh", "p999_ms_mean"] < summary.loc["DiskANN", "p999_ms_mean"]
    assert summary.loc["SPFresh", "p999_ms_max"] <= summary.loc["SPANN+", "p999_ms_max"]
    sp = series["SPFresh"]
    assert sp["p999_ms"].iloc[-1] < 1.5 * sp["p999_ms"].iloc[0]  # stability
    # memory: SPFresh far below DiskANN (paper: ≥5.3× lower)
    assert summary.loc["SPFresh", "mem_mb_max"] < summary.loc["DiskANN", "mem_mb_max"] / 5
    # LIRE stats exist and only a small fraction of inserts rebalance
    assert lire["rebalance_insert_frac"] < 0.2
