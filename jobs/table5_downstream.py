"""spark-submit entrypoint: Table V — replace the downstream task.

Features cached from FS_R / NFS / E-AFE runs are re-scored with SVM,
NB (classification) or GP (regression), and MLP, showing the selected
features are robust to the downstream model choice.

Usage: spark-submit jobs/table5_downstream.py [--refresh]
"""
import sys

from repro.bench.artifacts import RESULTS_DIR, get_grid
from repro.bench.session import get_spark
from repro.bench.tables import table5, to_markdown_table


def main() -> None:
    spark = get_spark("table5")
    grid = get_grid(spark, refresh="--refresh" in sys.argv)
    df = table5(grid)
    df.to_csv(RESULTS_DIR / "table5.csv", index=False)
    print(to_markdown_table(df))
    spark.stop()


if __name__ == "__main__":
    main()
