"""Table 4 (paper Figure 9 left): iteration (K3/K5) and disjunction (D3/D5)."""
from _common import emit, parse_args

from repro.harness.experiments import table4_operators


def main() -> None:
    args = parse_args(__doc__)
    emit(
        table4_operators(
            n_events=args.events, budget_s=args.budget, seed=args.seed
        )
    )


if __name__ == "__main__":
    main()
