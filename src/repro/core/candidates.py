"""SDC candidate generation (paper §5.1).

The grid is (evaluation function) x (d_in) x (d_out) x (m), with d_in/d_out
drawn from the per-kind threshold grids of ``typedetect.base.KIND_GRIDS``
and the matching percentage m from ``M_GRID``. Threshold *indices* into the
kind grid are carried alongside the raw values so the contingency job can
index the per-(column, func) CDF arrays directly.
"""
from __future__ import annotations

import pandas as pd

from repro.typedetect.base import KIND_GRIDS, M_GRID
from repro.typedetect.registry import Registry


def generate_candidates(registry: Registry, m_grid: tuple[float, ...] = M_GRID) -> pd.DataFrame:
    """All candidate SDCs for a registry.

    Columns: cand_id, func_id, kind, family, name, d_in, d_out, m,
    d_in_idx, d_out_idx (0-based indices into the kind's threshold list).
    """
    rows = []
    for spec in registry.specs:
        grid = KIND_GRIDS[spec.kind]
        thr = grid.thresholds
        for i_in in range(grid.n_in):
            for i_out in range(len(thr) - grid.n_out, len(thr)):
                if thr[i_out] < thr[i_in]:
                    continue
                for m in m_grid:
                    rows.append(
                        (
                            spec.func_id, spec.kind, spec.family, spec.name,
                            thr[i_in], thr[i_out], m, i_in, i_out,
                        )
                    )
    pdf = pd.DataFrame(
        rows,
        columns=[
            "func_id", "kind", "family", "name",
            "d_in", "d_out", "m", "d_in_idx", "d_out_idx",
        ],
    )
    pdf.insert(0, "cand_id", range(len(pdf)))
    return pdf
