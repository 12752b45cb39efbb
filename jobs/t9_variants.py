"""T9 (Fig 6a): normalization variants 1-3.

Run: ``python jobs/t9_variants.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t9

KWARGS: dict = dict(trials=2)

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t9_variants", table_t9(spark, **KWARGS))
    finally:
        spark.stop()
