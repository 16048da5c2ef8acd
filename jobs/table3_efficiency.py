"""Job: reproduce Table 3 (runtime + visit counts for the three algorithms)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table3  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table3")
    emit("Table 3 - efficiency", table3.run(spark=spark))
    spark.stop()
