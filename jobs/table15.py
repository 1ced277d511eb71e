"""Render the Table 15 report from a finished `run_cleanml.py` output.

    spark-submit jobs/table15.py [--results results/] [--out reports/table15.md]
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def main(spark, results_dir: str, out_path: str) -> str:
    import pandas as pd

    from repro.core.queries import register_relations
    from repro.core.report import table15_markdown

    relations = {
        name: pd.read_csv(os.path.join(results_dir, f"{name}.csv"))
        for name in ("R1", "R2", "R3")
    }
    register_relations(spark, relations)
    md = table15_markdown(spark)
    os.makedirs(os.path.dirname(out_path) or ".", exist_ok=True)
    with open(out_path, "w") as fh:
        fh.write(md)
    print(f"wrote {out_path} ({len(md)} bytes)")
    return md


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--results", default="results")
    ap.add_argument("--out", default="reports/table15.md")
    args = ap.parse_args()
    from pyspark.sql import SparkSession

    spark = SparkSession.builder.appName("cleanml-table15").getOrCreate()
    main(spark, args.results, args.out)
    spark.stop()
