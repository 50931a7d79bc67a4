"""Shared plumbing for the table jobs: results dir, markdown rendering,
and an optional SparkSession (only the business-scale jobs need one)."""
from __future__ import annotations

import os
import sys
from pathlib import Path

import pandas as pd

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark():
    """A SparkSession configured like conftest's fixture (for jobs that
    exercise the distributed engine)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def to_markdown(frame: pd.DataFrame) -> str:
    """Minimal GitHub-markdown table renderer (tabulate is not installed)."""
    cols = [str(c) for c in frame.columns]
    rows = [[("" if pd.isna(v) else str(v)) for v in r] for r in frame.itertuples(index=False)]
    widths = [max(len(c), *(len(r[i]) for r in rows)) if rows else len(c) for i, c in enumerate(cols)]
    head = "| " + " | ".join(c.ljust(w) for c, w in zip(cols, widths)) + " |"
    sep = "|" + "|".join("-" * (w + 2) for w in widths) + "|"
    body = ["| " + " | ".join(v.ljust(w) for v, w in zip(r, widths)) + " |" for r in rows]
    return "\n".join([head, sep, *body])


def emit(name: str, title: str, frame: pd.DataFrame, notes: str = "") -> None:
    """Print a table and persist it under results/<name>.md."""
    RESULTS_DIR.mkdir(exist_ok=True)
    text = f"# {title}\n\n{to_markdown(frame)}\n"
    if notes:
        text += f"\n{notes}\n"
    (RESULTS_DIR / f"{name}.md").write_text(text)
    print(f"\n=== {title} ===", file=sys.stderr)
    print(frame.to_string(index=False))
    print(f"[written to results/{name}.md]", file=sys.stderr)
