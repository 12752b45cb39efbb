"""T2 (Fig 3a/6f/6j): end-to-end accuracy vs label fraction f.

Run: ``python jobs/t2_accuracy_vs_f.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t2

KWARGS: dict = dict(trials=2, d=10.0, fs=(0.0008, 0.01, 0.1))

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t2_accuracy_vs_f", table_t2(spark, **KWARGS))
    finally:
        spark.stop()
