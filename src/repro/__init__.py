"""Reproduction of "To Index or Not to Index: Optimizing Maximum Inner
Product Search" (Abuzaid, Sethi, Bailis, Zaharia; ICDE 2019).

Subpackages:

* ``repro.linalg``   — blocked-GEMM top-K and canonical-ordering kernels
* ``repro.mf``       — synthetic ratings, ALS trainer, MF model generators
* ``repro.indexes``  — baselines: BlockedMM, LEMP-lite, FEXIPRO-lite
* ``repro.core``     — the paper's contributions: RECDEX and RECOPT
* ``repro.spark_ops``— strategies as Spark DataFrame operators
* ``repro.experiments`` — harnesses for the evaluation tables
"""
