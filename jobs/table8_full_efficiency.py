"""Job: Table 8 — full efficiency-technique × method cross product.

Shares the Table 5 runner (Table 8 is its superset in the paper).
"""
import argparse

from repro.experiments.session import get_spark
from repro.experiments.tables import table5_design_choices

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_spark("table8_full_efficiency")
    df = table5_design_choices(spark, scale=args.scale)
    print("\n=== Table 8 (lite): efficiency techniques x methods ===")
    print(df.to_string(index=False))
    spark.stop()
