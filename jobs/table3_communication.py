"""Table 3: communication cost (messages) to learn a Bayesian
classifier over 50K distributed training instances.

Usage: spark-submit jobs/table3_communication.py [network ...]
"""
import sys

from repro.experiments import (
    ALGOS,
    NETWORKS,
    PAPER_TABLE3,
    Config,
    get_spark,
    run_tables23,
)


def main() -> None:
    names = sys.argv[1:] or NETWORKS
    cfg = Config()
    spark = get_spark()
    results = run_tables23(spark, cfg, names)
    print(f"\nTable 3 — messages to learn the classifier ({cfg.m} instances)")
    print(f"{'Dataset':10s} " + " ".join(f"{a:>28s}" for a in ALGOS))
    for name in names:
        cells = []
        for a in ALGOS:
            ours = results[name][a]["messages"]
            paper = PAPER_TABLE3[name][a]
            cells.append(f"{ours:,} (paper {paper:,})")
        print(f"{name:10s} " + " ".join(f"{c:>28s}" for c in cells))


if __name__ == "__main__":
    main()
