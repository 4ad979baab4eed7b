"""Columnwise "BAT" kernels — the analogue of the paper's RMA+BAT backend.

A BAT is modelled as a 1-D numpy array (one column); a matrix is a list
of BATs. Kernels are restricted to whole-column vectorised operations
plus single-element selection (``sel``), mirroring how the paper reduces
value-based algorithms to MonetDB BAT operations (Section 7.3).
"""
from repro.batops import kernels, sparse  # noqa: F401
