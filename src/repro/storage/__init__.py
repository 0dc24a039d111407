"""Segment storage: the .mdb file format, footers, and the modelardb DataSourceV2 (paper §III-C)."""
