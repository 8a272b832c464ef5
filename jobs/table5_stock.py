"""Table 5 (paper Figure 9 right): stock-market queries Q1-Q7."""
from _common import emit, parse_args

from repro.harness.experiments import table5_stock


def main() -> None:
    args = parse_args(__doc__)
    emit(
        table5_stock(n_events=args.events, budget_s=args.budget, seed=args.seed)
    )


if __name__ == "__main__":
    main()
