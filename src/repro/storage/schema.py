"""Spark schemas for the ModelarDB+ storage layout (paper §III-C, Fig. 6).

Three logical tables:

* **Time Series** — per-Tid metadata: SI, scaling constant, assigned
  Gid, bit position in the group's gap mask, and the denormalised
  user-defined dimensions.  Stored as Parquet next to the segment files.
* **Model** — Mid → model-type name (the paper maps Mids to Java
  classpaths; here to the Python registry in ``repro.core``).
* **Segment** — the compressed segments; stored in the custom ``.mdb``
  format (``segment_store.py``) and scanned through the ``modelardb``
  DataSourceV2.  ``StartTime`` is derived from ``EndTime``, ``Size`` and
  ``SI`` on read, exactly as the paper's Cassandra schema does.
"""
from pyspark.sql.types import (BinaryType, IntegerType, LongType,
                               StructField, StructType)

SEGMENT_SCHEMA = StructType([
    StructField("gid", IntegerType()),
    StructField("start_time", LongType()),
    StructField("end_time", LongType()),
    StructField("si", IntegerType()),
    StructField("size", IntegerType()),
    StructField("mid", IntegerType()),
    StructField("gaps", LongType()),
    StructField("params", BinaryType()),
])

#: Columns of the paper's Segment View (§VI-A) before the denormalised
#: dimensions are appended by the query layer.
SEGMENT_VIEW_BASE = ("tid", "start_time", "end_time", "si", "mid",
                     "params", "gaps")

#: Columns of the Data Point View (§VI-A).
DATA_POINT_VIEW_BASE = ("tid", "ts", "value")
