"""In-Spark MPP-database emulation (CTAS/DROP/RENAME with metering)."""
from .engine import Engine, SpaceBudgetExceeded
from .metrics import EngineStats, QueryRecord

__all__ = ["Engine", "SpaceBudgetExceeded", "EngineStats", "QueryRecord"]
