"""Splice measured tables from ``results/*.md`` into EXPERIMENTS.md.

EXPERIMENTS.md contains ``<!-- RESULTS:<name> -->`` markers; each is replaced
by the marker line followed by the current contents of ``results/<name>.md``
(any previously spliced table is replaced, so the operation is idempotent).

    python -m repro.experiments.render
"""
from __future__ import annotations

import os
import re

from repro.experiments import RESULTS_DIR

_MARKER = re.compile(
    r"(<!-- RESULTS:(?P<name>[\w-]+) -->)(?P<old>\n\n\|[^\n]*(?:\n\|[^\n]*)*)?",
)


def render(experiments_path: str) -> int:
    """Rewrite ``experiments_path`` in place; returns #tables spliced."""
    text = open(experiments_path).read()
    spliced = 0

    def sub(m: re.Match) -> str:
        nonlocal spliced
        path = os.path.join(RESULTS_DIR, f"{m.group('name')}.md")
        if not os.path.exists(path):
            return m.group(1)
        spliced += 1
        return m.group(1) + "\n\n" + open(path).read().rstrip()

    open(experiments_path, "w").write(_MARKER.sub(sub, text))
    return spliced


def main() -> None:
    root = os.path.dirname(os.path.dirname(os.path.dirname(os.path.dirname(os.path.abspath(__file__)))))
    path = os.path.join(root, "EXPERIMENTS.md")
    print(f"spliced {render(path)} measured tables into {path}")


if __name__ == "__main__":
    main()
