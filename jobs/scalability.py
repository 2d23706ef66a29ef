"""Job: query-time scalability sweep (Fig. 10 data points; Table 5/8 support)."""
import argparse

from repro.experiments.session import get_spark
from repro.experiments.tables import scalability_sweep

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--bench", default="santos_large_lite")
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_spark("scalability")
    df = scalability_sweep(spark, bench=args.bench, scale=args.scale)
    print("\n=== Scalability (lite) ===")
    print(df.to_string(index=False))
    spark.stop()
