"""GoGraph core: metric function M(·), GetOptVal insertion, Algorithm 1."""
from repro.core.gograph import gograph_order, gograph_positions_spark  # noqa: F401
from repro.core.insertion import get_opt_val  # noqa: F401
from repro.core.metric import metric_m_local, metric_m_spark  # noqa: F401
