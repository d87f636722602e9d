"""Analytic auxiliary-space accounting (DESIGN.md §2).

All variants share one JVM, so per-variant RSS is meaningless; the
paper's space columns are reproduced from the data-structure sizes the
algorithms actually allocate:

- input graph: CSR at 8 bytes per vertex and per arc (paper Sec. 5.1);
- sketches: labels + sizes (+ center flags) — O((1 + αR)n), Thm. 3.1;
- selection structure: heap / P-tree nodes / Win-Tree id array;
- RIS: one 8-byte entry per (RR-set, member) pair plus the cover state.
"""
from __future__ import annotations

from repro.graphs.csr import CSR, csr_bytes


def pacim_bytes(csr: CSR, sketches, structure_bytes: int) -> dict:
    """Space breakdown for a PaC-IM run (any α, any selector)."""
    aux = sketches.aux_bytes() + structure_bytes + 8 * csr.n  # + init scores
    return {
        "csr_bytes": csr_bytes(csr),
        "aux_bytes": aux,
        "total_bytes": csr_bytes(csr) + aux,
    }


def ris_bytes(csr: CSR, total_rr_entries: int) -> dict:
    """Space breakdown for a Ripples-style RIS run."""
    aux = 8 * total_rr_entries + 8 * csr.n  # memberships + cover counters
    return {
        "csr_bytes": csr_bytes(csr),
        "aux_bytes": aux,
        "total_bytes": csr_bytes(csr) + aux,
    }
