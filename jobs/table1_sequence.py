"""Table 1 (paper Figure 7): sequence queries with output.

Run: spark-submit jobs/table1_sequence.py  (the experiment itself is
single-core engine execution, as in the paper; Spark is only the launcher).
"""
from _common import emit, parse_args

from repro.harness.experiments import table1_sequence


def main() -> None:
    args = parse_args(__doc__)
    emit(
        table1_sequence(
            n_events=args.events, budget_s=args.budget, seed=args.seed
        )
    )


if __name__ == "__main__":
    main()
