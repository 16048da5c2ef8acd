"""Job: reproduce Table 7 (landmark selection approximation error)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table7  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table7")
    errors, cores = table7.run(spark=spark)
    emit("Table 7 - landmark approximation error", errors.reset_index(names="selector"))
    emit("Table 7 (bottom) - max core index / size", cores)
    spark.stop()
