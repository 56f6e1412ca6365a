"""Fig. 4 — budget vs normalized Q-error and relative error.

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig4


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig4_qerror")
    try:
        table = table_fig4(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 4 — budget vs normalized Q-error and relative error")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
