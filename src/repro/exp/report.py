"""Persist formatted experiment tables.

pytest captures stdout of passing tests, so benchmark harnesses ALSO
write their formatted paper-table reproductions to ``results/<name>.txt``
(relative to the working directory, i.e. the repo root under pytest).
EXPERIMENTS.md quotes these files.
"""
from __future__ import annotations

from pathlib import Path


def save_report(name: str, text: str, *, directory: str = "results") -> Path:
    """Write ``text`` to ``<directory>/<name>.txt`` and echo it to stdout."""
    out = Path(directory)
    out.mkdir(parents=True, exist_ok=True)
    path = out / f"{name}.txt"
    path.write_text(text + "\n")
    print(text)
    return path
