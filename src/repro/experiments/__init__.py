"""Experiment harnesses: one module per evaluation table (DESIGN.md §3).

Each module exposes ``run(spark, **scale) -> pandas.DataFrame`` producing the
rows the paper's table reports (at reproduction scale), plus helpers used by
``jobs/`` entrypoints and ``benchmarks/``.  Measured numbers are recorded
next to the paper's in EXPERIMENTS.md.
"""

import os

import pandas as pd

#: where benchmark harnesses persist their measured tables
RESULTS_DIR = os.environ.get(
    "REPRO_RESULTS_DIR",
    os.path.join(os.path.dirname(__file__), "..", "..", "..", "results"),
)


def to_markdown(df: pd.DataFrame) -> str:
    """Render a DataFrame as a GitHub markdown table.

    (pandas' ``to_markdown`` needs the ``tabulate`` package, which this
    offline container lacks.)
    """
    cols = [str(c) for c in df.columns]
    body = [[str(v) for v in row] for row in df.itertuples(index=False)]
    widths = [
        max(len(c), *(len(r[i]) for r in body)) if body else len(c)
        for i, c in enumerate(cols)
    ]
    def fmt(row):
        return "| " + " | ".join(v.ljust(w) for v, w in zip(row, widths)) + " |"
    lines = [fmt(cols), "|" + "|".join("-" * (w + 2) for w in widths) + "|"]
    lines += [fmt(r) for r in body]
    return "\n".join(lines)


def print_table(title: str, df: pd.DataFrame) -> None:
    """Print an experiment's rows as a markdown table (for job output)."""
    print(f"\n## {title}\n")
    print(to_markdown(df))


def save_table(name: str, df: pd.DataFrame) -> str:
    """Persist a measured table under ``results/`` (markdown) and return path.

    Benchmarks both print and save, so the numbers survive pytest's stdout
    capture and can be diffed against the paper's in EXPERIMENTS.md.
    """
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.md")
    md = to_markdown(df)
    with open(path, "w") as f:
        f.write(md + "\n")
    print(f"\n## {name}\n\n{md}\n")
    return path
