"""spark-submit entrypoint: Table IV — downstream evaluation counts.

The paper's claim: E-AFE (and the dropout ablation) evaluate fewer than
half the features NFS evaluates. Counts are compared as ratios vs NFS
because absolute counts depend on the (scaled) epoch budget.

Usage: spark-submit jobs/table4_eval_counts.py [--refresh]
"""
import sys

from repro.bench.artifacts import RESULTS_DIR, get_grid
from repro.bench.session import get_spark
from repro.bench.tables import table4, to_markdown_table


def main() -> None:
    spark = get_spark("table4")
    grid = get_grid(spark, refresh="--refresh" in sys.argv)
    df = table4(grid)
    df.to_csv(RESULTS_DIR / "table4.csv", index=False)
    print(to_markdown_table(df))
    means = df.groupby("method")[["ratio_vs_nfs", "paper_ratio_vs_nfs"]].mean()
    print("\nMean ratio vs NFS:\n" + to_markdown_table(means.reset_index()))
    spark.stop()


if __name__ == "__main__":
    main()
