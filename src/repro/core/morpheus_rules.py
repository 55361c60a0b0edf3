"""Morpheus' factorized-learning rewrite rules as integrity constraints
(paper §9.2.2: "we incorporated them in our framework as a set of
integrity constraints").

A PK-FK join output viewed as a matrix is ``M = cbind(S, K @ R)`` where
``S`` holds the fact-side features, ``R`` the dimension-side features and
``K`` the sparse indicator matrix of the FK. Registering that fact (the
``cbind``/``multi_M`` atoms for M, see ``hybrid.views``) plus the generic
cbind laws below yields exactly Morpheus' pushdowns:

  rowSums(M) -> rowSums(S) + K rowSums(R)
  colSums(M) -> [colSums(S), colSums(K) R]          (colSums(K@R)=colSums(K)R
                                                     via the SystemML rule)
  C M        -> [C S, (C K) R]
  sum(M)     -> sum(S) + sum(K R)
"""
from __future__ import annotations

from .constraints import A, Rule, rows_eq, tgd


def cbind_rules() -> list[Rule]:
    r: list[Rule] = []
    r += tgd("cbind_colsums",
             [A("cbind", "X", "Y", "R"), A("colSums", "R", "Z")],
             [A("colSums", "X", "a"), A("colSums", "Y", "b"),
              A("cbind", "a", "b", "Z")],
             bidir=True, rev_guard=rows_eq("X", "Y"))
    r += tgd("cbind_rowsums",
             [A("cbind", "X", "Y", "R"), A("rowSums", "R", "Z")],
             [A("rowSums", "X", "a"), A("rowSums", "Y", "b"),
              A("add_M", "a", "b", "Z")],
             bidir=True)
    r += tgd("cbind_sum",
             [A("cbind", "X", "Y", "R"), A("sum", "R", "s")],
             [A("sum", "X", "s1"), A("sum", "Y", "s2"),
              A("add_S", "s1", "s2", "s")],
             bidir=True, rev_guard=rows_eq("X", "Y"))
    r += tgd("cbind_lmul",
             [A("cbind", "X", "Y", "R"), A("multi_M", "C", "R", "Z")],
             [A("multi_M", "C", "X", "a"), A("multi_M", "C", "Y", "b"),
              A("cbind", "a", "b", "Z")],
             bidir=True)
    return r
