"""Reproduce paper Table 4: pruning-rule triggers and pruned-cell %."""
import pandas as pd

from repro.experiments.tables import print_table, table4

from _common import run_cli


def main(spark, *, sf: float = 1.0) -> pd.DataFrame:
    df = table4(sf=sf)
    print_table(df, f"Table 4 — effect of pruning rules (sf={sf})")
    return df


if __name__ == "__main__":
    run_cli(main)
