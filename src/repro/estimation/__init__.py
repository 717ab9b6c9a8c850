"""Match-probability / fanout estimation (§3.2): naive and sampling."""
from .naive import naive_estimate
from .qerror import qerror
from .sampling import CorrelatedSample

__all__ = ["naive_estimate", "CorrelatedSample", "qerror"]
