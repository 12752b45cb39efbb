"""T6 (Fig 6g): accuracy vs number of classes k.

Run: ``python jobs/t6_vary_k.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t6

KWARGS: dict = dict(trials=1)

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t6_vary_k", table_t6(spark, **KWARGS))
    finally:
        spark.stop()
