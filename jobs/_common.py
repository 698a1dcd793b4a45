"""Shared plumbing for the experiment jobs.

Every ``jobs/<name>.py`` exposes ``run(spark, quick=False) -> DataFrame``
(a pandas table whose rows mirror the paper's figure/table) plus a
``main()`` wrapper for ``spark-submit``. Results are written to
``results/<name>.md`` and ``.json`` so EXPERIMENTS.md can be assembled
from committed artifacts.
"""
from __future__ import annotations

import json
import os
import sys
from pathlib import Path

import pandas as pd

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str):
    """SparkSession for standalone job execution (mirrors conftest)."""
    sys.path.insert(0, str(Path(__file__).resolve().parent.parent))
    import conftest  # noqa: F401  — sets PYSPARK_SUBMIT_ARGS pre-import

    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def save(name: str, table: pd.DataFrame, note: str = "") -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    table.to_json(RESULTS_DIR / f"{name}.json", orient="records", indent=1)
    with open(RESULTS_DIR / f"{name}.md", "w") as f:
        f.write(f"# {name}\n\n")
        if note:
            f.write(note + "\n\n")
        f.write("```\n")
        f.write(table.to_string(index=False, float_format=lambda x: f"{x:.4f}"))
        f.write("\n```\n")
    print(f"\n== {name} ==")
    print(table.to_string(index=False))


def run_main(module_run, name: str) -> None:
    quick = "--quick" in sys.argv
    spark = get_spark(name)
    try:
        table = module_run(spark, quick=quick)
        save(name, table)
    finally:
        spark.stop()
