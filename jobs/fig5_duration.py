#!/usr/bin/env python
"""Figure 5 — MCOS generation time vs duration d (w=300)."""
import os as _os
import sys as _sys

_sys.path.insert(0, _os.path.dirname(_os.path.dirname(_os.path.abspath(__file__))))

from jobs._common import emit, save_csv
from repro.bench import fig5_rows, format_rows


def main() -> None:
    rows = fig5_rows()
    emit(
        "Figure 5: MCOS generation time (s) vs duration d",
        format_rows(rows, ["dataset", "d", "method", "seconds", "results", "peak_states"]),
    )
    save_csv(rows, "fig5.csv")


if __name__ == "__main__":
    main()
