"""Reproduce paper Table I: datasets with edge/node counts and exact
transitive-closure sizes (scaled per DESIGN.md §4).

    spark-submit jobs/table1_datasets.py      # or plain python
"""
from repro.bench.suites import run_table1


def main() -> None:
    print("Table I — real and synthetic graphs (ours vs paper)")
    run_table1(with_tc=True)


if __name__ == "__main__":
    main()
