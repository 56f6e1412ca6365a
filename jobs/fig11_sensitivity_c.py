"""Fig. 11 — sensitivity to the Stage-1 fraction C.

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig11


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig11_sensitivity_c")
    try:
        table = table_fig11(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 11 — sensitivity to the Stage-1 fraction C")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
