"""Reproduce paper Table 3: the 20 selected queries + result counts."""
import pandas as pd

from repro.experiments.tables import print_table, table3

from _common import run_cli


def main(spark, *, sf: float = 1.0) -> pd.DataFrame:
    df = table3(sf=sf)
    print_table(df, f"Table 3 — selected temporal k-core queries (sf={sf})")
    return df


if __name__ == "__main__":
    run_cli(main)
