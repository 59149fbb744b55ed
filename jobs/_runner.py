"""Shared job harness: output locations and an optional SparkSession.

Jobs are ``spark-submit``-able scripts but most tables are pure codec
measurements; only the jobs that exercise the distributed path create a
session (with the same conservative local-mode settings as conftest).
"""
from __future__ import annotations

import json
import os
import sys
from pathlib import Path

RESULTS = Path(__file__).resolve().parent.parent / "results"


def emit(name: str, rows: list[dict], text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / f"{name}.json").write_text(json.dumps(rows, indent=1))
    print(text)
    print(f"\n[{name}] {len(rows)} rows -> {RESULTS / (name + '.json')}")


def get_spark():
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def scale_arg(default: str = "bench") -> str:
    for a in sys.argv[1:]:
        if a.startswith("--scale="):
            return a.split("=", 1)[1]
    return os.environ.get("REPRO_SCALE", default)
