"""Benchmark for Table 1 — global rebuild vs LIRE incremental cost."""
from repro.experiments import run_t1_rebuild_cost
from repro.harness import render_table


def test_t1_rebuild_cost(benchmark):
    df = benchmark.pedantic(
        lambda: run_t1_rebuild_cost(n_base=4_000), rounds=1, iterations=1
    )
    print("\n" + render_table(df))
    by = df.set_index("system")
    # Paper shape: a global rebuild costs orders of magnitude more wall
    # time and far more peak memory than absorbing a 1% batch in place.
    assert (
        by.loc["DiskANN global rebuild", "wall_s"]
        > 10 * by.loc["SPFresh incremental (1% batch)", "wall_s"]
    )
    assert (
        by.loc["SPANN global rebuild", "peak_mem_mb"]
        > by.loc["SPFresh incremental (1% batch)", "peak_mem_mb"]
    )
    # Paper Table 1: DiskANN's rebuild is the most memory-hungry.
    assert (
        by.loc["DiskANN global rebuild", "peak_mem_mb"]
        > by.loc["SPANN global rebuild", "peak_mem_mb"]
    )
