"""Fig. 7 — group-by with a single group-key oracle (max RMSE).

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig7


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig7_groupby_single")
    try:
        table = table_fig7(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 7 — group-by with a single group-key oracle (max RMSE)")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
