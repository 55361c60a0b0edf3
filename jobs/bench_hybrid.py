"""§9.2.2 (Figures 10-11): the hybrid micro-benchmark Q1-Q10 on the
Twitter-like dataset (3 keyword selectivities) and the MIMIC-like
dataset (3 care units).

Run: spark-submit jobs/bench_hybrid.py [--quick]
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.expected import PAPER_SPEEDUPS
from repro.hybrid.datasets import mimic_like, twitter_like
from repro.hybrid.queries import build_context, p3_pipelines, run_hybrid_query

ALL_Q = [f"P3.{i}" for i in range(1, 11)]


def _run_suite(spark, tables, label, pids, out) -> None:
    ctx = build_context(spark, tables)
    print(f"\n### {label} (N rows = {ctx.nT}, hashtags/services = {ctx.nH})",
          file=out)
    print("| query | original s | HADAD s | speedup | paper | views used |",
          file=out)
    print("|---|---|---|---|---|---|", file=out)
    for pid in pids:
        run = run_hybrid_query(ctx, pid)
        assert run.rel_diff < 1e-5, f"{pid}: wrong result ({run.rel_diff})"
        q = "Q" + pid.split(".")[1]
        print(f"| {q} ({pid}) | {run.t_original:.2f} | {run.t_hadad:.2f} "
              f"| {run.speedup:.1f}x | {PAPER_SPEEDUPS.get(q, '-')} "
              f"| {','.join(run.rw.used_views) or '-'} |", file=out)


def main(spark: SparkSession, out=sys.stdout, quick: bool = False) -> None:
    pids = ALL_Q[:4] if quick else ALL_Q
    for kw in (["covid"] if quick else ["covid", "trump", "election"]):
        t = twitter_like(spark, n_tweets=4000, n_users=200, n_hashtags=60,
                         keyword=kw, seed=9)
        _run_suite(spark, t, f"Twitter-like, keyword='{kw}'", pids, out)
    for cu in (["CCU"] if quick else ["CCU", "TSICU", "MICU"]):
        t = mimic_like(spark, n_admissions=4000, n_patients=200,
                       n_services=60, care_unit=cu, seed=4)
        _run_suite(spark, t, f"MIMIC-like, care unit {cu}", pids, out)


if __name__ == "__main__":
    s = (SparkSession.builder.appName("bench_hybrid")
         .config("spark.sql.autoBroadcastJoinThreshold", -1)
         .getOrCreate())
    main(s, quick="--quick" in sys.argv)
    s.stop()
