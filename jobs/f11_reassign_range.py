"""Figure 11 — reassign range parameter study."""
from repro.experiments import run_f11_reassign_range
from repro.harness import render_table


def main() -> None:
    df = run_f11_reassign_range(n_base=4_000)
    print("== Figure 11 (scaled): reassign range sweep ==")
    print(render_table(df))


if __name__ == "__main__":
    main()
