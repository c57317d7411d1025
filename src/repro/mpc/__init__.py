"""MPC substrate: iterative shuffle-round helpers.

The shared :class:`repro.runtime.RoundContext` does the shuffle
accounting; this package holds the MPC-side conveniences (in-memory
cutoff threshold handling lives in the individual algorithms, which
mirror the paper's per-algorithm cutoffs).
"""
from repro.runtime import RoundContext  # noqa: F401

#: Scaled in-memory cutoff: the paper switches to a single machine below
#: 5×10^7 edges on graphs of up to 2.3×10^11 edges (ratio ~2×10^-4 of
#: the largest input). Our largest stand-ins have ~3.5×10^5 edges; the
#: same ratio gives a cutoff of ~10^2 (DESIGN.md §5) — this keeps the
#: MPC phase counts in the paper's reported band instead of letting the
#: rootset algorithms collapse to a single phase at toy scale.
DEFAULT_CUTOFF_EDGES = 200
