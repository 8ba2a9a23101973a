"""Entrypoint for the Figure-5 table (α sweep)."""
from repro.experiments import figure5_alpha_sweep


def main() -> None:
    print(figure5_alpha_sweep.format_table(figure5_alpha_sweep.run()))


if __name__ == "__main__":
    main()
