"""TPC-H-lite union-of-joins workloads UQ1/UQ2/UQ3 (§9 "Datasets")."""
from .base import Tier, tiered_key_variant, Workload  # noqa: F401
from .uq1 import uq1  # noqa: F401
from .uq2 import uq2  # noqa: F401
from .uq3 import uq3  # noqa: F401
