"""Job: reproduce Table 4 (relative error / tight fraction of the bounds)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table4  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table4")
    emit("Table 4 - bound quality", table4.run(spark=spark))
    spark.stop()
