"""Reproduction of "Fries: Fast and Consistent Runtime Reconfiguration in
Dataflow Systems with Transactional Guarantees" (VLDB 2022).

Subpackages: ``core`` (the Fries scheduler algorithms), ``engine`` (the
simulated distributed pipelined engine substrate), ``workflows`` (W1–W5,
engine specs + Spark data planes), ``streaming`` (Spark mini-batch and
swap-schedule executors), ``ml`` (fraud-model substrate), plus the provided
``synth_data`` generators and the DuckDB ``oracle``.
"""
