"""Job: reproduce Table 2 (max core index / distinct cores, h=1..5)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table2  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table2")
    emit("Table 2 - (k,h)-core characterization", table2.run(spark=spark))
    spark.stop()
