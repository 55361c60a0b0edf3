"""Morpheus substrate: factorized linear algebra over normalized (PK-FK
joined) data, after Chen et al., "Towards Linear Algebra over Normalized
Data" (PVLDB 2017) — the system HADAD's §9.2.1 experiments run on."""
