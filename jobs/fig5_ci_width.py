"""Fig. 5 — budget vs bootstrap CI width and coverage.

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig5


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig5_ci_width")
    try:
        table = table_fig5(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 5 — budget vs bootstrap CI width and coverage")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
