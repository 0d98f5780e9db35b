"""Spark backend: lowers Tydi-IR Streamlets to composable PySpark
DataFrame operators.

The paper's IR deliberately does not express behaviour — a Streamlet's
behaviour is a *linked implementation* in a target language (Section
5.2). The VHDL backend links ``.vhd`` files; this backend links Python
functions over Spark DataFrames. The IR contributes exactly what the
paper claims it contributes: typed interface contracts between
components (port schemas derived from Tydi logical types, checked at
composition time) and structural composition (instances + connections
become a dataflow of DataFrame transformations).
"""

from .pipeline import SparkBackend  # noqa: F401
from .schema import spark_schema, check_port_schema, SchemaMismatch  # noqa: F401
