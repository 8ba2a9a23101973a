"""Entrypoint for the Figure-4 table (gap to switching oracles)."""
from repro.experiments import figure4_gap


def main() -> None:
    rows = figure4_gap.run()
    print(figure4_gap.format_table(rows))
    print()
    for g in figure4_gap.gaps(rows):
        print(
            f"{g['dataset']}: OREO query cost {g['vs_mts_optimal_pct']:+.1f}% vs MTS Optimal, "
            f"{g['vs_offline_optimal_pct']:+.1f}% vs Offline Optimal "
            f"(moves: oreo {g['moves_oreo']}, mts {g['moves_mts_optimal']}, offline {g['moves_offline']})"
        )


if __name__ == "__main__":
    main()
