"""Figure 12 — fore/background update pipeline balance."""
from repro.experiments import run_f12_pipeline
from repro.harness import render_table


def main() -> None:
    fore, back, model = run_f12_pipeline(n_base=8_000)
    print(
        f"measured fore_us/update={model.fore_us_per_update:.1f} "
        f"back_us/update={model.back_us_per_update:.1f} "
        f"(ratio {model.fore_us_per_update / max(model.back_us_per_update, 1e-9):.2f}:1)"
    )
    print("== Figure 12 left (scaled): foreground scaling, 1 background thread ==")
    print(render_table(fore))
    print("== Figure 12 right (scaled): background scaling, 8 foreground threads ==")
    print(render_table(back))
    print(f"min background threads to keep up with 8 foreground: {model.min_back_threads(8)}")


if __name__ == "__main__":
    main()
