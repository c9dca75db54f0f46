"""Workload substrate: TPC-H-lite query templates, query→file mapping, and
the enterprise access-log simulator (paper §III 'Datasets and Workloads')."""
