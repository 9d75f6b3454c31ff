"""Benchmark for Table 3 + Figure 9 — stress test, core + Spark legs."""
from repro.experiments import THREADS_TABLE3, run_f9_spark_leg, run_f9_stress
from repro.harness import render_table


def test_f9_stress_core(benchmark):
    out = benchmark.pedantic(
        lambda: run_f9_stress(n_base=6_000, n_epochs=10, n_queries=200),
        rounds=1,
        iterations=1,
    )
    print("\n" + render_table(THREADS_TABLE3))
    for label, ts in out.items():
        print(f"-- {label} --")
        print(render_table(ts[["epoch", "recall", "p999_ms", "mem_mb"]]))
        # Paper shapes: stable P99.9 and an accuracy floor per dataset,
        # the uniform dataset recalling at least as well as the skewed one.
        assert ts["p999_ms"].iloc[-1] < 2.0 * ts["p999_ms"].iloc[0]
        assert ts["recall"].min() > 0.75
    assert out["uniform"]["recall"].min() >= out["skew"]["recall"].min() - 0.05


def test_f9_stress_spark_leg(spark, benchmark, tmp_path):
    df = benchmark.pedantic(
        lambda: run_f9_spark_leg(
            spark, str(tmp_path / "idx"), n_base=3_000, n_epochs=3, n_queries=60
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + render_table(df))
    assert (df["recall"] > 0.8).all()
    assert (df["max_posting"] <= 96).all()  # split limit enforced by jobs
