"""Table 2 (paper Figure 8 left): sequence queries without output, window scaling."""
from _common import emit, parse_args

from repro.harness.experiments import table2_window


def main() -> None:
    args = parse_args(__doc__)
    emit(
        table2_window(n_events=args.events, budget_s=args.budget, seed=args.seed)
    )


if __name__ == "__main__":
    main()
