"""T11 (Fig 12): two-value H/L heuristic vs DCEr vs GS.

Run: ``python jobs/t11_heuristic.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t11

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t11_heuristic", table_t11(spark, **KWARGS))
    finally:
        spark.stop()
