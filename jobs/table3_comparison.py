"""spark-submit entrypoint: Table III — scores on the 36-dataset roster.

Runs (or loads from results/grid.csv) the full method x dataset grid and
prints measured scores joined with the paper's published values.

Usage: spark-submit jobs/table3_comparison.py [--refresh]
"""
import sys

from repro.bench.artifacts import RESULTS_DIR, get_grid
from repro.bench.session import get_spark
from repro.bench.tables import table3, to_markdown_table


def main() -> None:
    spark = get_spark("table3")
    grid = get_grid(spark, refresh="--refresh" in sys.argv)
    df = table3(grid)
    df.to_csv(RESULTS_DIR / "table3.csv", index=False)
    print(to_markdown_table(df))
    pivot = df.pivot_table(index="method", values=["score", "paper_score"])
    print("\nPer-method means:\n" + to_markdown_table(pivot.reset_index()))
    spark.stop()


if __name__ == "__main__":
    main()
