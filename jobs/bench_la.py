"""§9.1.1-9.1.2 (Figures 5-8): Q_exec vs RW_find+RW_exec speed-ups on the
Spark COO substrate.

Rewrites are selected under the paper's γ (naïve estimator) so the plans
match Tables 12/13/15; one extra row shows P2.25 under the substrate-
aware JoinWorkEstimator, where HADAD correctly prefers the no-view plan
on this COO engine.

Run: spark-submit jobs/bench_la.py
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.expected import PAPER_SPEEDUPS, VIEWS_FOR
from repro.bench.harness import run_pipeline
from repro.bench.pipelines import ALL
from repro.core.cost import JoinWorkEstimator, NaiveEstimator

NOVIEWS = ["P1.1", "P1.4", "P1.13", "P1.15", "P2.10", "P2.12"]
WITH_VIEWS = ["P2.14", "P2.21", "P2.25", "P2.27"]


def _row(pid, mode, t, out):
    print(f"| {pid} | {mode} | {t.q_exec:.2f} | {t.rw_find:.3f} "
          f"| {t.rw_exec:.2f} | {t.speedup:.1f}x "
          f"| {PAPER_SPEEDUPS.get(pid, '-')} | `{t.best[:60]}` |", file=out)


def main(spark: SparkSession, out=sys.stdout) -> None:
    print("| pipeline | mode | Q_exec s | RW_find s | RW_exec s | speedup | "
          "paper | rewrite |", file=out)
    print("|---|---|---|---|---|---|---|---|", file=out)
    for pid in NOVIEWS:
        t = run_pipeline(spark, pid, ALL[pid], estimator=NaiveEstimator())
        assert t.rel_diff < 1e-6, f"{pid}: wrong rewrite result"
        _row(pid, "no views", t, out)
    for pid in WITH_VIEWS:
        t = run_pipeline(spark, pid, ALL[pid], view_names=VIEWS_FOR[pid],
                         estimator=NaiveEstimator())
        assert t.rel_diff < 1e-6, f"{pid}: wrong rewrite result"
        _row(pid, f"views {','.join(VIEWS_FOR[pid])}", t, out)
    t = run_pipeline(spark, "P2.25", ALL["P2.25"],
                     view_names=VIEWS_FOR["P2.25"],
                     estimator=JoinWorkEstimator())
    assert t.rel_diff < 1e-6
    _row("P2.25", "views, substrate-aware γ", t, out)


if __name__ == "__main__":
    s = (SparkSession.builder.appName("bench_la")
         .config("spark.sql.autoBroadcastJoinThreshold", -1)
         .config("spark.sql.shuffle.partitions", "64")
         .getOrCreate())
    main(s)
    s.stop()
