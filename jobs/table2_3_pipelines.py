"""Regenerate Tables 2-3 (pipeline definitions) and Tables 12-13 (the
rewrites HADAD finds without views), with estimated costs.

Run: spark-submit jobs/table2_3_pipelines.py   (Spark is only needed by
the shared entrypoint convention — the rewriting itself is driver-side.)
"""
import sys

from repro.bench.expected import EXPECTED_NOVIEWS
from repro.bench.pipelines import ALL, P_NOOPT
from repro.core import expr as E
from repro.core.cost import NaiveEstimator, gamma
from repro.core.rewriter import hadad_rewrite, proves_equiv


def main(out=sys.stdout) -> None:
    est = NaiveEstimator()
    print("| pipeline | expression | HADAD rewrite | gamma before | gamma after "
          "| matches paper (Tables 12-13) |", file=out)
    print("|---|---|---|---|---|---|", file=out)
    for pid, expr in ALL.items():
        r = hadad_rewrite(expr)
        if pid in P_NOOPT:
            exp = EXPECTED_NOVIEWS[pid]
            ok = (gamma(r.best, est) <= gamma(exp, est) + 1e-6
                  and proves_equiv(expr, exp))
            match = "yes" if ok else "NO"
        else:
            match = "n/a (P^Opt)"
        print(f"| {pid} | `{E.to_str(expr)}` | `{E.to_str(r.best)}` "
              f"| {r.cost_before:.0f} | {r.cost_after:.0f} | {match} |",
              file=out)


if __name__ == "__main__":
    main()
