#!/usr/bin/env python
"""Figure 6 — MCOS generation time vs window size w (d=240)."""
import os as _os
import sys as _sys

_sys.path.insert(0, _os.path.dirname(_os.path.dirname(_os.path.abspath(__file__))))

from jobs._common import emit, save_csv
from repro.bench import fig6_rows, format_rows


def main() -> None:
    rows = fig6_rows()
    emit(
        "Figure 6: MCOS generation time (s) vs window w",
        format_rows(rows, ["dataset", "w", "method", "seconds", "results", "peak_states"]),
    )
    save_csv(rows, "fig6.csv")


if __name__ == "__main__":
    main()
