"""T7 (Fig 6h): DCEr accuracy vs number of restarts.

Run: ``python jobs/t7_restarts.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t7

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t7_restarts", table_t7(spark, **KWARGS))
    finally:
        spark.stop()
