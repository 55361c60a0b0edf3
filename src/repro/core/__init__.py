"""HADAD core: hybrid LA/RA expressions, relational (VREM) encoding,
chase-based rewriting under integrity constraints, cost models, decoding."""
