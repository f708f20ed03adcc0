"""Reproduce Section V-D: runtime of sketch path vs full-join path.

Usage: ``python jobs/timing.py`` (single-node measurement, matching the
paper's setting; no cluster needed). Prints per-N wall times for the
full join, sketch join, full-data MI estimation and sketch MI
estimation, and writes them to ``results/timing.csv``.
"""
from __future__ import annotations

import pathlib

from repro.experiments import timing


def main() -> None:
    df = timing.measure()
    out = pathlib.Path(__file__).resolve().parent.parent / "results"
    out.mkdir(exist_ok=True)
    df.to_csv(out / "timing.csv", index=False)
    print("\n=== Section V-D (reproduction) ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
