"""workloads subpackage of the Loom reproduction."""
