"""Benchmark for Figure 8 — search QPS / IOPS vs search threads."""
from repro.experiments import run_f8_search_scaling
from repro.harness import render_table


def test_f8_search_scaling(benchmark):
    df, model = benchmark.pedantic(
        lambda: run_f8_search_scaling(n_base=4_000), rounds=1, iterations=1
    )
    print("\n" + render_table(df))
    # Paper shape: QPS grows with threads then flattens at the device
    # IOPS ceiling; IOPS never exceeds the device limit.
    assert df["qps"].iloc[3] > df["qps"].iloc[0]
    assert df["qps"].iloc[-1] == df["qps"].iloc[-2]
    assert (df["disk_iops"] <= model.device_iops + 1e-6).all()
    assert 1 <= model.saturation_threads() <= 16
