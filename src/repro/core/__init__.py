"""GeoBlocks core: the paper's primary contribution.

- :mod:`repro.core.raw` — the extract & reorganize phase (sorted columnar
  raw storage keyed by s2lite point keys), shared with the on-the-fly
  baselines.
- :mod:`repro.core.build` — distributed (Spark DataFrame) and driver-side
  (numpy) GeoBlock header construction.
- :mod:`repro.core.geoblock` — the V1 storage layout + query algorithm
  and the V2 adaptive engine.
- :mod:`repro.core.stats_trie` / :mod:`repro.core.agg_trie` — the
  query-driven adaptation machinery.
- :mod:`repro.core.spark_query` — the distributed query path (pre-agg
  headers vs. on-the-fly raw scans as Catalyst range joins).
"""
