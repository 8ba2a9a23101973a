"""Entrypoint for the Figure-6 table (ε sweep)."""
from repro.experiments import figure6_eps_sweep


def main() -> None:
    print(figure6_eps_sweep.format_table(figure6_eps_sweep.run()))


if __name__ == "__main__":
    main()
