"""§9.2.1 (Figure 9): Morpheus alone vs Morpheus + HADAD over a tuple-
ratio sweep on synthetic PK-FK joins.

Run: spark-submit jobs/bench_morpheus.py
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.expected import PAPER_SPEEDUPS
from repro.morpheus.bench import gen_normalized, pipelines, run_one

PIDS = ["P1.12", "P2.10", "P2.11", "P2.15"]
RATIOS = [2, 6, 12]


def main(spark: SparkSession, out=sys.stdout) -> None:
    print("| pipeline | tuple ratio | Morpheus s | +HADAD s | speedup | "
          "paper | rewrite |", file=out)
    print("|---|---|---|---|---|---|---|", file=out)
    for tr in RATIOS:
        nm = gen_normalized(spark, n_r=2000, d_r=20, d_s=10, tuple_ratio=tr)
        for pid in PIDS:
            run = run_one(spark, pid, nm, tr)
            assert run.rel_diff < 1e-6, f"{pid}@{tr}: wrong result"
            print(f"| {pid} | {tr} | {run.t_morpheus:.2f} | {run.t_hadad:.2f} "
                  f"| {run.speedup:.1f}x | {PAPER_SPEEDUPS.get(pid, '-')} "
                  f"| `{run.rewrite[:55]}` |", file=out)


if __name__ == "__main__":
    s = (SparkSession.builder.appName("bench_morpheus")
         .config("spark.sql.autoBroadcastJoinThreshold", -1)
         .getOrCreate())
    main(s)
    s.stop()
