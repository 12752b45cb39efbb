"""T8 (Fig 6b-d): lambda / ell_max sensitivity.

Run: ``python jobs/t8_lambda.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t8

KWARGS: dict = dict(trials=1)

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t8_lambda", table_t8(spark, **KWARGS))
    finally:
        spark.stop()
