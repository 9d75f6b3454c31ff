"""Benchmark for Figure 11 — reassign range parameter study."""
from repro.experiments import run_f11_reassign_range
from repro.harness import render_table


def test_f11_reassign_range(benchmark):
    df = benchmark.pedantic(
        lambda: run_f11_reassign_range(
            n_base=3_000, n_epochs=15, n_queries=200, ranges=(0, 2, 8, 32)
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + render_table(df))
    # Paper shapes: more neighbor postings checked → more vectors
    # evaluated/moved, recall no worse; gains plateau at the high end.
    assert df["reassign_evaluated"].is_monotonic_increasing
    assert df["recall@10"].iloc[-1] >= df["recall@10"].iloc[0] - 0.01
    top_gain = df["recall@10"].iloc[-1] - df["recall@10"].iloc[-2]
    full_gain = abs(df["recall@10"].iloc[-1] - df["recall@10"].iloc[0]) + 1e-9
    assert top_gain <= max(0.02, 0.8 * full_gain)  # wanes at the tail
