"""T1 (Fig 8): dataset stats + DCEr runtime per analog dataset.

Run: ``python jobs/t1_dataset_stats.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t1

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t1_dataset_stats", table_t1(spark, **KWARGS))
    finally:
        spark.stop()
