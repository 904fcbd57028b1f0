"""partitioners subpackage of the Loom reproduction."""
