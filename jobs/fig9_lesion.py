"""Fig. 9 — lesion study (sample reuse, two-stage allocation).

Reproduces the numbers behind the figure (see DESIGN.md §4 and
EXPERIMENTS.md for paper-vs-measured).
"""
from _common import build_session, job_args, print_table

from repro.experiments.tables import table_fig9


def main() -> None:
    args = job_args(__doc__)
    spark = build_session("fig9_lesion")
    try:
        table = table_fig9(
            spark, scale=args.scale, n_trials=args.trials, seed=args.seed
        )
        print_table(table, "Fig. 9 — lesion study (sample reuse, two-stage allocation)")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
