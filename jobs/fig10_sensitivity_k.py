"""Fig. 10 — sensitivity to the number of strata K.

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig10


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig10_sensitivity_k")
    try:
        table = table_fig10(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 10 — sensitivity to the number of strata K")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
