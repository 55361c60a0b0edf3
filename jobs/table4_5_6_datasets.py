"""Regenerate Tables 4-6: the paper's datasets vs our scaled synthetic
stand-ins (dimensions, nnz, sparsity)."""
import sys

from repro.bench.datasets import REAL_LIKE, REAL_PAPER, SYN, SYN_PAPER


def main(out=sys.stdout) -> None:
    print("## Table 4 — real sparse matrices (paper) vs synthetic stand-ins (ours)", file=out)
    print("| name | paper rows x cols | paper nnz | paper sparsity | "
          "ours rows x cols | ours nnz | ours sparsity |", file=out)
    print("|---|---|---|---|---|---|---|", file=out)
    for name, (r, c, nnz) in REAL_PAPER.items():
        sr, sc, snnz = REAL_LIKE[name]
        print(f"| {name} | {r}x{c} | {nnz} | {nnz/(r*c):.4%} "
              f"| {sr}x{sc} | {snnz} | {snnz/(sr*sc):.4%} |", file=out)
    print("\n## Table 5 — synthetic dense matrices", file=out)
    print("| name | paper | ours |", file=out)
    print("|---|---|---|", file=out)
    for name, (r, c) in SYN_PAPER.items():
        sr, sc = SYN[name]
        print(f"| {name} | {r}x{c} | {sr}x{sc} |", file=out)
    print("\n## Table 6 — matrix-name bindings: see repro/bench/pipelines.py "
          "(A,B=Syn3; C,D=Syn5; M=Syn1; N=Syn2; R=Syn10; X=AL3-like; "
          "v1=Syn7 (200x1 against D in P2.21); u1,v2 sized to X)", file=out)


if __name__ == "__main__":
    main()
