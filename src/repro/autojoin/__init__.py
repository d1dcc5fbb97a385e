"""Auto-Join baseline (paper §3.2): blind backtracking transformation search."""
from .runner import AutoJoinResult, autojoin
from .search import AutoJoinConfig, autojoin_single

__all__ = ["AutoJoinConfig", "AutoJoinResult", "autojoin", "autojoin_single"]
