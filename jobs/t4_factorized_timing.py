"""T4 (Fig 5b): explicit W^l vs factorized sketch timing.

Run: ``python jobs/t4_factorized_timing.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t4

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t4_factorized_timing", table_t4(spark, **KWARGS))
    finally:
        spark.stop()
