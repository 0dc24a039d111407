"""Baseline systems: industry formats, Cassandra/InfluxDB simulators, ModelarDB v1 (paper §VII-A)."""
