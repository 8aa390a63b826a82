"""§8.1 workflows: engine specs (``defs``), Spark data planes
(``spark_queries``) and Spark-derived calibration (``profiles``)."""
from .defs import w1, w2, w3, w4, w5

__all__ = ["w1", "w2", "w3", "w4", "w5"]
