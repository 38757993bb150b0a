"""spark-submit entrypoint: Table VI — significance of the improvements.

Paired t-tests (from-scratch Student-t, repro.stats) of E-AFE against
FS_R / DL_N / NFS across the 36 datasets, on both score and wall time.

Usage: spark-submit jobs/table6_pvalues.py [--refresh]
"""
import sys

from repro.bench.artifacts import RESULTS_DIR, get_grid
from repro.bench.session import get_spark
from repro.bench.tables import table6, to_markdown_table


def main() -> None:
    spark = get_spark("table6")
    grid = get_grid(spark, refresh="--refresh" in sys.argv)
    df = table6(grid)
    df.to_csv(RESULTS_DIR / "table6.csv", index=False)
    print(to_markdown_table(df, floatfmt=4))
    spark.stop()


if __name__ == "__main__":
    main()
