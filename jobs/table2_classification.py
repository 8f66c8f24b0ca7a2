"""Table 2: error rate for Bayesian classification, 50K training
instances, 1000 tests (REPRO_M / REPRO_TESTS to override).

Usage: spark-submit jobs/table2_classification.py [network ...]
"""
import sys

from repro.experiments import (
    ALGOS,
    NETWORKS,
    PAPER_TABLE2,
    Config,
    get_spark,
    run_tables23,
)


def main() -> None:
    names = sys.argv[1:] or NETWORKS
    cfg = Config()
    spark = get_spark()
    results = run_tables23(spark, cfg, names)
    print(f"\nTable 2 — classification error rate ({cfg.m} training instances)")
    print(f"{'Dataset':10s} " + " ".join(f"{a:>22s}" for a in ALGOS))
    for name in names:
        cells = []
        for a in ALGOS:
            ours = results[name][a]["cls_err"]
            paper = PAPER_TABLE2[name][a]
            cells.append(f"{ours:.3f} (paper {paper:.3f})")
        print(f"{name:10s} " + " ".join(f"{c:>22s}" for c in cells))


if __name__ == "__main__":
    main()
