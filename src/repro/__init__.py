"""PySpark reproduction of ModelarDB+ (ICDE 2021): MMGC/GOLEMM compression,
dimension-based grouping, a model-based segment store, and aggregate query
processing on models.  See DESIGN.md for the architecture map."""
