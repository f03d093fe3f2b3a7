#!/usr/bin/env python
"""Figure 4 — MCOS generation time vs total frames (w=300, d=240)."""
import os as _os
import sys as _sys

_sys.path.insert(0, _os.path.dirname(_os.path.dirname(_os.path.abspath(__file__))))

from jobs._common import emit, save_csv
from repro.bench import fig4_rows, format_rows


def main() -> None:
    rows = fig4_rows()
    emit(
        "Figure 4: MCOS generation time (s) vs #frames",
        format_rows(rows, ["dataset", "frames", "method", "seconds", "results", "peak_states"]),
    )
    save_csv(rows, "fig4.csv")


if __name__ == "__main__":
    main()
