"""Benchmark for Figure 10 — update-technique accuracy/latency tradeoff."""
from repro.experiments import run_f10_ablation
from repro.harness import render_table


def test_f10_ablation(benchmark):
    df = benchmark.pedantic(
        lambda: run_f10_ablation(
            n_base=3_000, n_epochs=15, n_queries=200, nprobes=(2, 4, 8, 16)
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + render_table(df))
    at16 = df[df["nprobe"] == 16].set_index("system")
    # Paper shapes at matched accuracy budget: append-only pays the most
    # latency; adding split cuts it; split+reassign is closest to Static.
    assert (
        at16.loc["in-place only (SPANN+)", "avg_ms"]
        > at16.loc["in-place + split + reassign (SPFresh)", "avg_ms"]
    )
    gap_spfresh = abs(
        at16.loc["in-place + split + reassign (SPFresh)", "recall@10"]
        - at16.loc["Static", "recall@10"]
    )
    assert gap_spfresh < 0.05
    # recall improves as the latency budget (nprobe) relaxes, per system
    for name, grp in df.groupby("system"):
        g = grp.sort_values("nprobe")
        assert g["recall@10"].iloc[-1] >= g["recall@10"].iloc[0] - 1e-9
