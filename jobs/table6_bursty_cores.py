"""Reproduce paper Table 6: <=1-day temporal 10-cores from a full-span
scan of the Youtube-like graph (the paper's "full graph scan" test)."""
import pandas as pd

from repro.experiments.tables import print_table, table6

from _common import run_cli


def main(spark, *, sf: float = 1.0) -> pd.DataFrame:
    df = table6(sf=sf)
    print_table(df, f"Table 6 — <=1-day temporal 10-cores on youtube (sf={sf})")
    return df


if __name__ == "__main__":
    run_cli(main)
