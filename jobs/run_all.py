"""Run every experiment and regenerate EXPERIMENTS.md + results/.

Usage: spark-submit jobs/run_all.py [--quick]

``--quick`` shrinks the sweeps (used by CI-style smoke runs); the
default reproduces the paper's table scale (m=50K, k=30, eps=0.1,
1000 tests) plus the supplementary figure-shaped sweeps.
"""
import os
import sys
import time

from repro import experiments as ex


def main() -> None:
    quick = "--quick" in sys.argv
    cfg = ex.Config()
    spark = ex.get_spark()
    results: dict = {}
    t0 = time.time()

    def stamp(label: str) -> None:
        print(f"[run_all] {label} done at {time.time()-t0:.0f}s", flush=True)

    results["table1"] = ex.table1_rows()
    stamp("table1")

    nets = ["alarm", "hepar2"] if quick else list(ex.NETWORKS)
    results["tables23"] = ex.run_tables23(spark, cfg, nets)
    stamp("tables 2+3")

    fig9_m = 100_000 if quick else 1_000_000
    results["fig9_network"] = "alarm"
    results["fig9"] = ex.comm_vs_m(spark, "alarm", fig9_m, cfg)
    stamp("fig9")

    fig5_m = 50_000 if quick else 500_000
    results["fig5_network"] = "hepar2"
    results["fig5"] = ex.error_vs_m(spark, "hepar2", fig5_m, cfg)
    stamp("fig5")

    results["fig10_network"] = "hepar2"
    results["fig10"] = ex.error_vs_eps("hepar2", [0.02, 0.05, 0.1, 0.2, 0.4], cfg)
    stamp("fig10")

    results["fig11a"] = ex.comm_vs_k("alarm", [10, 20, 30, 40, 50], cfg)
    stamp("fig11a")

    fig11b_m = 200_000 if quick else 5_000_000
    results["fig11b"] = ex.new_alarm_comm(
        spark, fig11b_m, cfg, paper_regime=not quick
    )
    stamp("fig11b")

    root = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
    ex.save_json(os.path.join(root, "results", "results.json"), results)
    with open(os.path.join(root, "EXPERIMENTS.md"), "w") as f:
        f.write(ex.render_experiments_md(results, cfg))
    print(f"[run_all] wrote EXPERIMENTS.md and results/results.json "
          f"({time.time()-t0:.0f}s total)")


if __name__ == "__main__":
    main()
