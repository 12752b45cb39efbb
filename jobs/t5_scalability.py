"""T5 (Fig 6k/3b): estimation vs propagation scalability in m.

Run: ``python jobs/t5_scalability.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t5

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t5_scalability", table_t5(spark, **KWARGS))
    finally:
        spark.stop()
