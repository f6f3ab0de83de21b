"""Reproduction of "Qd-tree: Learning Data Layouts for Big Data
Analytics" (SIGMOD 2020) on PySpark.

Subpackages: ``core`` (qd-tree + construction algorithms), ``rl`` (numpy
PPO substrate), ``baselines`` (random/range/Bottom-Up), ``spark_io``
(partitioned-Parquet layouts + BID routing), ``workloads`` (TPC-H-denorm
and ErrorLog generators), ``experiments`` (Table 2 / physical harnesses).
"""
