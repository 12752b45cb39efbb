"""T12 (Fig 14): L2 distance of estimates from GS per dataset.

Run: ``python jobs/t12_l2.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t12

KWARGS: dict = dict(trials=1)

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t12_l2", table_t12(spark, **KWARGS))
    finally:
        spark.stop()
