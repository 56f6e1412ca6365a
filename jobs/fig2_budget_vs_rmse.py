"""Fig. 2 — sampling budget vs RMSE (ABAE vs uniform, six datasets).

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig2


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig2_budget_vs_rmse")
    try:
        table = table_fig2(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 2 — sampling budget vs RMSE (ABAE vs uniform, six datasets)")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
