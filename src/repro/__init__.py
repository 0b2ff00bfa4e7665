"""Reproduction of MISCELA-V (EDBT 2021): CAP mining over smart-city
sensor data as distributed PySpark dataflow, plus the serving substrates
(store, cache, upload, API, viz payloads). See DESIGN.md for the map."""
