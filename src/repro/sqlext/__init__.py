"""SQL front-end for RMA (§7.2): ``SELECT * FROM INV(r BY U)``."""
from repro.sqlext.parser import rma_sql  # noqa: F401
