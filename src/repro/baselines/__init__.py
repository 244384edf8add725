"""Competing methods of §VII-A: SparkSQL, HCubeJ, HCubeJ+Cache, BigJoin."""
