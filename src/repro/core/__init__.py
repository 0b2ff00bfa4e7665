"""CAP mining core — the paper's primary contribution (MISCELA).

Layout mirrors MISCELA's four steps (paper §2.2):

1. :mod:`repro.core.segmentation` — linear segmentation noise filter.
2. :mod:`repro.core.evolving`     — evolving-timestamp extraction (ε).
3. :mod:`repro.core.spatial` + :mod:`repro.core.components` — η-neighbor
   graph and spatially connected sensor sets.
4. :mod:`repro.core.search`       — per-component CAP search with
   anti-monotone support pruning.

:mod:`repro.core.miscela` wires the steps into one DataFrame pipeline;
:mod:`repro.core.baseline` is the unpruned comparator used by Table 4.
"""
from repro.core.types import CAP, MiscelaParams  # noqa: F401
from repro.core.miscela import mine_caps  # noqa: F401
