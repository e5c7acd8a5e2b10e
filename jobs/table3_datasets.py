"""Reproduce paper Tables 3 & 4: dataset statistics for the lite stand-ins.

    spark-submit jobs/table3_datasets.py
"""
import pandas as pd

from _common import base_parser, finish
from repro.experiments.harness import datasets_table, evolving_datasets_table


def main() -> None:
    args = base_parser(__doc__).parse_args()
    t3 = datasets_table()
    t4 = evolving_datasets_table()
    finish(pd.concat([t3, t4], ignore_index=True), args)


if __name__ == "__main__":
    main()
