"""Figure 2 — static vs naive in-place update (recall drop, tail blow-up)."""
from repro.experiments import run_f2_inplace
from repro.harness import render_table


def main() -> None:
    df = run_f2_inplace(n_total=8_000)
    print("== Figure 2 (scaled): static vs in-place-only ==")
    print(render_table(df))


if __name__ == "__main__":
    main()
