"""Job: reproduce Table 1 (dataset characteristics), ours vs paper."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table1  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table1")
    emit("Table 1 - dataset characteristics", table1.run(spark=spark))
    spark.stop()
