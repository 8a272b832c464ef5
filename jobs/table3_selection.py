"""Table 3 (paper Figure 8 right): selection strategies."""
from _common import emit, parse_args

from repro.harness.experiments import table3_selection


def main() -> None:
    args = parse_args(__doc__)
    emit(
        table3_selection(
            n_events=args.events, budget_s=args.budget, seed=args.seed
        )
    )


if __name__ == "__main__":
    main()
