"""T3 (Fig 5a): consistency of NB vs full-path statistics.

Run: ``python jobs/t3_consistency.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t3

KWARGS: dict = dict(trials=2)

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t3_consistency", table_t3(spark, **KWARGS))
    finally:
        spark.stop()
