"""Table III: dataset statistics for the three (substituted) lakes."""
from __future__ import annotations

from repro.experiments.common import lwdc_lake, open_lake, swdc_lake

__all__ = ["PAPER_TABLE3", "dataset_stats", "format_table3"]

#: The paper's Table III rows, for side-by-side comparison.
PAPER_TABLE3 = [
    {"dataset": "OPEN", "n_vectors": "17.2M", "n_columns": "21.6K",
     "avg_vectors_per_col": 796, "model": "fastText", "dim": 300},
    {"dataset": "SWDC", "n_vectors": "8.6M", "n_columns": "516K",
     "avg_vectors_per_col": 16.7, "model": "GloVe", "dim": 50},
    {"dataset": "LWDC", "n_vectors": "602M", "n_columns": "48.9M",
     "avg_vectors_per_col": 12.3, "model": "GloVe", "dim": 50},
]


def dataset_stats() -> list[dict]:
    """Our Table III: one stats row per generated lake."""
    return [open_lake(0).stats(), swdc_lake(0).stats(), lwdc_lake(0).stats()]


def format_table3(rows: list[dict]) -> str:
    hdr = f"{'Dataset':12s} {'# Vec.':>10s} {'# Col.':>8s} {'Avg.#Vec':>9s} {'Model':>10s} {'Dim.':>5s}"
    lines = [hdr, "-" * len(hdr)]
    for r in rows:
        lines.append(
            f"{str(r['dataset']):12s} {str(r['n_vectors']):>10s} "
            f"{str(r['n_columns']):>8s} {str(r['avg_vectors_per_col']):>9s} "
            f"{str(r['model']):>10s} {str(r['dim']):>5s}"
        )
    return "\n".join(lines)
