"""spark-submit entrypoint: Table I — NFS one-epoch time breakdown.

Runs an instrumented single-epoch NFS on PimaIndian / credit-a /
diabetes / German Credit and prints generation vs evaluation time next
to the paper's numbers. The reproduced claim is the split (evaluation
dominates the epoch; generation is negligible), not absolute seconds.

Usage: spark-submit jobs/table1_nfs_timing.py
"""
from repro.bench.artifacts import RESULTS_DIR
from repro.bench.tables import table1, to_markdown_table


def main() -> None:
    df = table1()
    RESULTS_DIR.mkdir(exist_ok=True)
    df.to_csv(RESULTS_DIR / "table1.csv", index=False)
    print(to_markdown_table(df))


if __name__ == "__main__":
    main()
