"""Figure 8 — search throughput / disk IOPS vs number of search threads."""
from repro.experiments import run_f8_search_scaling
from repro.harness import render_table


def main() -> None:
    df, model = run_f8_search_scaling(n_base=8_000)
    print("== Figure 8 (scaled): search scaling on the device model ==")
    print(
        f"measured cpu_us/query={model.cpu_us_per_query:.1f} "
        f"blocks/query={model.blocks_per_query:.2f} device_iops={model.device_iops:.0f}"
    )
    print(render_table(df))
    print(f"saturation at ~{model.saturation_threads()} search threads")


if __name__ == "__main__":
    main()
