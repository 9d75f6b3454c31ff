"""Benchmark for Figure 12 — fore/background pipeline balance."""
from repro.experiments import run_f12_pipeline
from repro.harness import render_table


def test_f12_pipeline(benchmark):
    fore, back, model = benchmark.pedantic(
        lambda: run_f12_pipeline(n_base=4_000, n_updates=1_200), rounds=1, iterations=1
    )
    print("\n" + render_table(fore))
    print(render_table(back))
    # Paper shapes: update throughput is the min of the two stages — the
    # foreground sweep saturates once the single background thread binds,
    # and adding background threads under 8 foreground threads recovers
    # throughput until the foreground binds again.
    assert fore["update_qps"].is_monotonic_increasing or (
        fore["update_qps"].iloc[-1] == fore["update_qps"].max()
    )
    assert back["update_qps"].is_monotonic_increasing or (
        back["update_qps"].iloc[-1] == back["update_qps"].max()
    )
    assert model.min_back_threads(8) <= 8
    # background per-update cost is below foreground cost (the 2:1 story)
    assert model.back_us_per_update < model.fore_us_per_update
