"""Shared plumbing for the ``jobs/`` spark-submit entrypoints.

Each job builds a local SparkSession configured like the pytest fixture
(broadcast joins disabled, Arrow on), runs one table driver, prints the
paper-vs-measured frame, and writes ``results/<name>.csv`` + a markdown
snippet for EXPERIMENTS.md.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

import pandas as pd
from pyspark.sql import SparkSession


def make_session(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def to_markdown(df: pd.DataFrame) -> str:
    """GitHub-table rendering without the optional ``tabulate`` dep."""
    cells = df.astype(str)
    widths = [max(len(c), cells[c].str.len().max() if len(cells) else 0)
              for c in cells.columns]
    def row(vals):
        return "| " + " | ".join(v.ljust(w) for v, w in zip(vals, widths)) + " |"
    lines = [row(list(cells.columns)),
             "|" + "|".join("-" * (w + 2) for w in widths) + "|"]
    lines += [row(list(r)) for r in cells.itertuples(index=False)]
    return "\n".join(lines) + "\n"


def emit(df: pd.DataFrame, name: str, outdir: str | None = None) -> None:
    """Print the table and persist CSV + markdown under ``results/``."""
    out = Path(outdir or os.environ.get("REPRO_RESULTS_DIR", "results"))
    out.mkdir(parents=True, exist_ok=True)
    print(f"\n=== {name} ===", file=sys.stderr)
    print(df.to_string(index=False))
    df.to_csv(out / f"{name}.csv", index=False)
    (out / f"{name}.md").write_text(to_markdown(df))
