"""Mixed relational/linear workloads from §5 and §8.6 of the paper."""
from repro.workloads.covariance import covariance, covariance_via_cpd  # noqa: F401
from repro.workloads.regression import ols  # noqa: F401
