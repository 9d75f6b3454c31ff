"""Figure 10 — accuracy/latency tradeoff: append-only → +split → +reassign → static."""
from repro.experiments import run_f10_ablation
from repro.harness import render_table


def main() -> None:
    df = run_f10_ablation(n_base=6_000)
    print("== Figure 10 (scaled): update-technique tradeoff ==")
    print(render_table(df))


if __name__ == "__main__":
    main()
