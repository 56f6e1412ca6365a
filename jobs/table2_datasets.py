"""Table 2 — dataset inventory: paper datasets vs our surrogates.

Prints paper sizes, surrogate sizes at the chosen scale, realized
predicate positive rates, and the oracle/proxy substitutions.
"""
from _common import job_args, print_table

from repro.experiments.tables import table2_datasets


def main() -> None:
    args = job_args(__doc__)
    print_table(table2_datasets(scale=args.scale), "Table 2 — dataset inventory")


if __name__ == "__main__":
    main()
