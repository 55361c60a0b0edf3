"""§9.1.3: distribution of RW_find across all 57 pipelines, naive and MNC
cost models (percentage under 20/25 ms, max, P^Opt vs P¬Opt split)."""
import statistics
import sys

from repro.bench.harness import mnc_estimator_for
from repro.bench.pipelines import ALL, P_NOOPT, P_OPT
from repro.core.rewriter import hadad_rewrite


def _dist(times_ms):
    times_ms = sorted(times_ms)
    pct = lambda t: 100 * sum(1 for x in times_ms if x <= t) / len(times_ms)  # noqa: E731
    return (f"n={len(times_ms)} median={statistics.median(times_ms):.1f}ms "
            f"<=20ms:{pct(20):.0f}% <=25ms:{pct(25):.0f}% "
            f"max={times_ms[-1]:.0f}ms")


def main(out=sys.stdout) -> None:
    for est_name in ("naive", "mnc"):
        rows = {}
        for pid, expr in ALL.items():
            est = mnc_estimator_for(expr) if est_name == "mnc" else None
            # warm once, measure second run (paper reports steady-state)
            hadad_rewrite(expr, estimator=est)
            r = hadad_rewrite(expr, estimator=est)
            rows[pid] = r.rw_find_s * 1e3
        print(f"[{est_name}] all 57:  {_dist(list(rows.values()))}", file=out)
        print(f"[{est_name}] P-noopt: {_dist([rows[p] for p in P_NOOPT])}", file=out)
        print(f"[{est_name}] P-opt:   {_dist([rows[p] for p in P_OPT])}", file=out)


if __name__ == "__main__":
    main()
