#!/usr/bin/env python
"""Figure 7 — MCOS generation time vs occlusion (id reuse) p_o."""
import os as _os
import sys as _sys

_sys.path.insert(0, _os.path.dirname(_os.path.dirname(_os.path.abspath(__file__))))

from jobs._common import emit, save_csv
from repro.bench import fig7_rows, format_rows


def main() -> None:
    rows = fig7_rows()
    emit(
        "Figure 7: MCOS generation time (s) vs p_o",
        format_rows(rows, ["dataset", "p_o", "method", "seconds", "results", "peak_states"]),
    )
    save_csv(rows, "fig7.csv")


if __name__ == "__main__":
    main()
